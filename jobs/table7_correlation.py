"""Reproduce Table VII (correlation discovery vs the QCR sketch baseline).
Usage: ``spark-submit jobs/table7_correlation.py [scale]``."""
import sys

from _session import get_spark

from repro.harness.common import fmt_markdown
from repro.harness.table7 import run_table7


def main(spark, scale: str = "bench") -> list[dict]:
    rows = run_table7(spark, scale=scale)
    print("\n## Table VII — Correlation-based discovery\n")
    print(fmt_markdown(rows))
    return rows


if __name__ == "__main__":
    scale = sys.argv[1] if len(sys.argv) > 1 else "bench"
    spark = get_spark("table7")
    main(spark, scale)
    spark.stop()
