"""Sliding-window assignment (Definition 2's WITHIN/SLIDE clause).

An event at time t belongs to every window ``w_i = [i*slide,
i*slide + within)`` with ``i >= 0`` that contains t. Following the
paper's assumption 2, all queries of a workload share one (within,
slide) pair, so the stream is exploded once for every engine — the
replication factor ``ceil(within/slide)`` hits all engines equally.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def explode_windows(events: DataFrame, *, within: int, slide: int) -> DataFrame:
    """Spark: add a ``wid`` column, one output row per (event, window)."""
    lo = F.greatest(
        F.lit(0), (F.floor((F.col("time") - F.lit(within)) / F.lit(slide)) + 1)
    )
    hi = F.floor(F.col("time") / F.lit(slide))
    return events.withColumn("wid", F.explode(F.sequence(lo, hi)))


def explode_windows_pandas(
    events: pd.DataFrame, *, within: int, slide: int
) -> pd.DataFrame:
    """Pandas twin of :func:`explode_windows` — feeds the DuckDB oracle
    the exact same (event, window) relation the engines see."""
    t = events["time"].to_numpy()
    lo = np.maximum(0, (t - within) // slide + 1)
    hi = t // slide
    reps = (hi - lo + 1).astype(int)
    out = events.loc[events.index.repeat(reps)].reset_index(drop=True)
    wid = np.concatenate([np.arange(a, b + 1) for a, b in zip(lo, hi)])
    out["wid"] = wid.astype("int64")
    return out.sort_values(["wid", "key", "time"], kind="stable").reset_index(
        drop=True
    )


def n_windows(duration: int, *, within: int, slide: int) -> int:
    """Number of windows that overlap [0, duration)."""
    return max(0, (duration - 1) // slide + 1)
