"""Reproduce Table VIII (index storage: BLEND vs combination of SOTA
indexes). Usage: ``spark-submit jobs/table8_index_size.py [scale]``."""
import sys

from _session import get_spark

from repro.harness.common import fmt_markdown
from repro.harness.table8 import run_table8


def main(spark, scale: str = "bench") -> list[dict]:
    rows = run_table8(spark, scale=scale)
    print("\n## Table VIII — Index storage\n")
    print(fmt_markdown(rows))
    return rows


if __name__ == "__main__":
    scale = sys.argv[1] if len(sys.argv) > 1 else "bench"
    spark = get_spark("table8")
    main(spark, scale)
    spark.stop()
