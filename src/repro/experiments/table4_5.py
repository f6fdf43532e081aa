"""Tables IV & V — Covtype/Household descriptor tables (same shape as I/II)."""
from __future__ import annotations

import pandas as pd

from repro.datasets import ONE_TO_ONE
from repro.experiments.table1_2 import table1_rows, table2_rows


def table4_rows(spark, *, scale: float = 0.6) -> pd.DataFrame:
    return table1_rows(spark, scale=scale, gens=ONE_TO_ONE)


def table5_rows(spark, *, scale: float = 0.6) -> pd.DataFrame:
    return table2_rows(spark, scale=scale, gens=ONE_TO_ONE)
