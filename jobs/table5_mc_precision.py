"""Reproduce Table V (multi-column join precision vs MATE). Usage:
``spark-submit jobs/table5_mc_precision.py [scale]``."""
import sys

from _session import get_spark

from repro.harness.common import fmt_markdown
from repro.harness.table5 import run_table5


def main(spark, scale: str = "bench") -> list[dict]:
    rows = run_table5(spark, scale=scale)
    print("\n## Table V — MC precision: BLEND vs MATE\n")
    print(fmt_markdown(rows))
    return rows


if __name__ == "__main__":
    scale = sys.argv[1] if len(sys.argv) > 1 else "bench"
    spark = get_spark("table5")
    main(spark, scale)
    spark.stop()
