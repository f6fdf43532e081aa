"""Reproduce the paper's Table III.

Usage: spark-submit jobs/table3.py   (or: python jobs/table3.py)
Env: REPRO_SCALE (default 0.6), REPRO_SEED, REPRO_FAST=1 for a quick pass.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import get_spark  # noqa: E402

from repro.experiments import run_table3  # noqa: E402


def main() -> None:
    spark = get_spark("feataug-table3")
    spark.sparkContext.setLogLevel("ERROR")
    run_table3(spark)
    spark.stop()


if __name__ == "__main__":
    main()
