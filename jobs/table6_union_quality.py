"""Reproduce Table VI (union-search quality vs Starmie). Usage:
``spark-submit jobs/table6_union_quality.py [scale]``."""
import sys

from _session import get_spark

from repro.harness.common import fmt_markdown
from repro.harness.table6 import run_table6


def main(spark, scale: str = "bench") -> list[dict]:
    rows = run_table6(spark, scale=scale)
    print("\n## Table VI — Union search quality: BLEND vs Starmie-sim\n")
    print(fmt_markdown(rows))
    return rows


if __name__ == "__main__":
    scale = sys.argv[1] if len(sys.argv) > 1 else "bench"
    spark = get_spark("table6")
    main(spark, scale)
    spark.stop()
