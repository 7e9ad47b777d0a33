"""Table VII: indexing time and index size (number of candidate cliques).

Pipeline per (dataset, k): LP computes S, then the Spark-parallel
Algorithm 5 builds the candidate index; we report the build wall time
and the index size, as the paper does.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core import kernels
from repro.core.lp import lp_numpy
from repro.dynamic import index as idx_mod
from repro.dynamic import state as st_mod
from repro.graphs import adjacency as adj_mod
from repro.graphs import datasets


def build_state(e: np.ndarray, k: int) -> st_mod.DynamicState:
    """LP from scratch + node scores -> a DynamicState ready for
    indexing (shared by Table VII/VIII harnesses and benchmarks)."""
    res = lp_numpy(e, k)
    rank = adj_mod.rank_by_degree(e)
    adj = adj_mod.orient_by_rank(e, rank)
    counts: dict[int, int] = {}
    for u in adj:
        kernels.count_from_source(adj, u, k, counts)
    return st_mod.from_edges(e, k, res.S, counts)


def run(
    spark: SparkSession,
    names: list[str] | None = None,
    ks: tuple[int, ...] = (3, 4, 5, 6),
) -> pd.DataFrame:
    names = names or list(datasets.DATASETS)
    rows = []
    for name in names:
        e = datasets.edges(name)
        row: dict = {"Dataset": name}
        for k in ks:
            state = build_state(e, k)
            t0 = time.monotonic()
            size = idx_mod.build_index_spark(spark, state)
            secs = time.monotonic() - t0
            row[f"time_k{k}(ms)"] = round(secs * 1e3, 1)
            row[f"size_k{k}"] = size
        rows.append(row)
        print(pd.DataFrame([row]).to_string(index=False))
    return pd.DataFrame(rows)
