"""Reproduce Table IV (optimizer effectiveness). Usage:
``spark-submit jobs/table4_optimizer.py [scale]``."""
import sys

from _session import get_spark

from repro.harness.common import fmt_markdown
from repro.harness.table4 import run_table4


def main(spark, scale: str = "bench") -> list[dict]:
    rows = run_table4(spark, scale=scale)
    print("\n## Table IV — Optimizer effectiveness\n")
    print(fmt_markdown(rows))
    return rows


if __name__ == "__main__":
    scale = sys.argv[1] if len(sys.argv) > 1 else "bench"
    spark = get_spark("table4")
    main(spark, scale)
    spark.stop()
