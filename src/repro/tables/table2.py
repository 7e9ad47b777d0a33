"""Table II: size of S for OPT, HG, GC(Δ), LP(Δ) across datasets and k.

Δ for GC/LP is reported relative to HG, as in the paper. Also records
the per-algorithm runtime (the paper's Fig. 6 uses the same runs) and
the counters Table III's space proxies need.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.gc import gc
from repro.core.hg import hg
from repro.core.lp import lp
from repro.core.opt import opt
from repro.graphs import datasets
from repro.tables import common


def run(
    spark: SparkSession,
    names: list[str] | None = None,
    ks: tuple[int, ...] = (3, 4, 5, 6),
    algos: tuple[str, ...] = ("OPT", "HG", "GC", "LP"),
    max_cliques: int = common.DEFAULT_MAX_CLIQUES,
    max_seconds: float = common.DEFAULT_MAX_SECONDS,
    opt_max_seconds: float = 60.0,
) -> pd.DataFrame:
    """One row per (dataset, k): sizes, deltas, runtimes, counters."""
    names = names or list(datasets.DATASETS)
    rows = []
    for name in names:
        e = datasets.edges(name)
        df = datasets.edges_to_df(spark, e)
        for k in ks:
            row: dict = {"Name": name, "k": k, "n": int(e.max()) + 1, "m": len(e)}
            hg_size = None
            if "HG" in algos:
                st, out, secs = common.run_cell(hg, spark, df, k)
                hg_size = out.size if st == "OK" else None
                row["HG"] = common.cell(st, getattr(out, "size", None))
                row["t_HG(s)"] = round(secs, 2)
            if "GC" in algos:
                st, out, secs = common.run_cell(
                    gc, spark, df, k, budget=common.fresh_budget(max_cliques, max_seconds)
                )
                row["GC"] = common.cell(st, getattr(out, "size", None))
                row["GC_delta"] = (
                    out.size - hg_size if st == "OK" and hg_size is not None else None
                )
                row["t_GC(s)"] = round(secs, 2)
                row["GC_n_cliques"] = out.n_cliques if st == "OK" else None
            if "LP" in algos:
                st, out, secs = common.run_cell(
                    lp, spark, df, k, budget=common.fresh_budget(max_cliques, max_seconds)
                )
                row["LP"] = common.cell(st, getattr(out, "size", None))
                row["LP_delta"] = (
                    out.size - hg_size if st == "OK" and hg_size is not None else None
                )
                row["t_LP(s)"] = round(secs, 2)
                row["LP_heap"] = out.n_heap_init if st == "OK" else None
            if "OPT" in algos:
                st, out, secs = common.run_cell(
                    opt, spark, df, k,
                    budget=common.fresh_budget(max_cliques, opt_max_seconds),
                )
                row["OPT"] = common.cell(st, getattr(out, "size", None))
                row["t_OPT(s)"] = round(secs, 2)
            rows.append(row)
            print(pd.DataFrame([row]).to_string(index=False))
    return pd.DataFrame(rows)
