"""Reproduce Table III (complex discovery tasks). Usage:
``spark-submit jobs/table3_complex_tasks.py [scale]`` (scale: test|bench)."""
import sys

from _session import get_spark

from repro.harness.common import fmt_markdown
from repro.harness.table3 import run_table3


def main(spark, scale: str = "bench") -> list[dict]:
    rows = run_table3(spark, scale=scale)
    print("\n## Table III — Complex discovery tasks\n")
    print(fmt_markdown(rows))
    return rows


if __name__ == "__main__":
    scale = sys.argv[1] if len(sys.argv) > 1 else "bench"
    spark = get_spark("table3")
    main(spark, scale)
    spark.stop()
