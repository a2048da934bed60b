"""A-Seq: online, non-shared event sequence aggregation (paper Section
3.2, the executor both Sharon and the benchmarks build on).

A-Seq is exactly the Sharon executor with an empty sharing plan: every
query evaluates its full pattern as one private chain. Kept as its own
module because the paper treats it as a distinct competitor.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame

from ..core.model import Workload
from .sharon import run_plan, run_plan_pandas


def run_aseq(events: DataFrame, workload: Workload) -> DataFrame:
    """COUNT(*) per (window, key, query), each query independent."""
    return run_plan(events, workload, plan=None)


def run_aseq_pandas(
    events: pd.DataFrame, workload: Workload
) -> tuple[pd.DataFrame, dict]:
    return run_plan_pandas(events, workload, plan=None)
