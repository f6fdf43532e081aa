"""Reproduce Tables I, II, IV, V (dataset / query-template descriptors).

Usage: spark-submit jobs/dataset_info.py   (or: python jobs/dataset_info.py)
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import get_spark  # noqa: E402

from repro.experiments import save_and_print, table1_rows, table2_rows  # noqa: E402
from repro.experiments.harness import DEFAULT_SCALE  # noqa: E402
from repro.experiments.table4_5 import table4_rows, table5_rows  # noqa: E402


def main() -> None:
    spark = get_spark("feataug-dataset-info")
    spark.sparkContext.setLogLevel("ERROR")
    save_and_print(table1_rows(spark, scale=DEFAULT_SCALE), "table1")
    save_and_print(table2_rows(spark, scale=DEFAULT_SCALE), "table2")
    save_and_print(table4_rows(spark, scale=DEFAULT_SCALE), "table4")
    save_and_print(table5_rows(spark, scale=DEFAULT_SCALE), "table5")
    spark.stop()


if __name__ == "__main__":
    main()
