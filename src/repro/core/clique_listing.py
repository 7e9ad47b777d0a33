"""Distributed k-clique listing and counting (DataFrame API).

The substrate every algorithm shares. Two implementations:

- :func:`list_kcliques` / :func:`node_clique_counts` — the production
  path: orient the graph by a total ordering computed with window
  functions, broadcast the oriented adjacency, and fan the per-source
  kClist recursion out over a partitioned source-node DataFrame with
  ``mapInPandas`` (Arrow). Counting never materializes cliques, which
  is what makes Algorithm 3 "lightweight".

- :func:`list_kcliques_joins` — a pure Catalyst reference: iterated
  self-joins on the id-oriented edge table. Quadratically many joins
  in k, only used to cross-check the kernel path (and the DuckDB
  oracle) on small graphs.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import kernels
from repro.core.budgets import Budget, translate_spark_error
from repro.graphs import adjacency as adj_mod


def member_cols(k: int) -> list[str]:
    """Canonical member column names for a clique DataFrame."""
    return [f"m{i}" for i in range(k)]


def _clique_schema(k: int) -> str:
    return ", ".join(f"{c} long" for c in member_cols(k))


def _prepare(
    spark: SparkSession, edges_df: DataFrame, ordering: DataFrame
) -> tuple[dict[int, np.ndarray], "pyspark.Broadcast"]:
    """Orient by ``ordering``, collect out-adjacency, broadcast it."""
    oriented = adj_mod.oriented_edges(edges_df, ordering)
    adj = adj_mod.collect_out_adjacency(oriented)
    return adj, spark.sparkContext.broadcast(adj)


def _sources_df(spark: SparkSession, adj: dict[int, np.ndarray], k: int) -> DataFrame:
    """Nodes that can root a k-clique (out-degree >= k-1), spread over
    partitions so mapInPandas tasks balance."""
    srcs = [int(u) for u, nb in adj.items() if len(nb) >= k - 1]
    pdf = pd.DataFrame({"source": pd.Series(srcs, dtype="int64")})
    n_part = max(1, min(spark.sparkContext.defaultParallelism * 2, max(1, len(srcs) // 4)))
    # Shuffle sources so heavy hubs don't cluster in one partition.
    pdf = pdf.sample(frac=1.0, random_state=0) if len(pdf) else pdf
    return spark.createDataFrame(pdf).repartition(n_part)


def list_kcliques(
    spark: SparkSession,
    edges_df: DataFrame,
    k: int,
    ordering: DataFrame | None = None,
    budget: Budget | None = None,
) -> DataFrame:
    """All k-cliques of the graph, one row each, member columns
    ``m0 < m1 < ... < m{k-1}`` (node-id order — the canonical clique
    identity). Each clique is produced exactly once, rooted at its
    highest-ordering member."""
    if ordering is None:
        ordering = adj_mod.ordering_by_degree(edges_df)
    _, bc = _prepare(spark, edges_df, ordering)
    deadline = budget.epoch_deadline if budget is not None else None
    cols = member_cols(k)

    def enum_batches(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        adj = bc.value
        for batch in batches:
            rows: list[tuple[int, ...]] = []
            for src in batch["source"].to_numpy(np.int64):
                kernels.enumerate_from_source(adj, int(src), k, out=rows, deadline=deadline)
            yield pd.DataFrame(rows, columns=cols, dtype="int64") if rows else pd.DataFrame(
                {c: pd.Series(dtype="int64") for c in cols}
            )

    sources = _sources_df(spark, bc.value, k)
    return sources.mapInPandas(enum_batches, schema=_clique_schema(k))


def node_clique_counts(
    spark: SparkSession,
    edges_df: DataFrame,
    k: int,
    ordering: DataFrame | None = None,
    budget: Budget | None = None,
) -> DataFrame:
    """Node scores (Def. 5): ``(node, score)`` where score is the
    number of k-cliques containing the node; nodes in no k-clique get
    score 0. Cliques are never stored: each task folds its sources'
    enumerations into a local counter (Algorithm 3 line 2)."""
    if ordering is None:
        ordering = adj_mod.ordering_by_degree(edges_df)
    _, bc = _prepare(spark, edges_df, ordering)
    deadline = budget.epoch_deadline if budget is not None else None

    def count_batches(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        adj = bc.value
        counts: dict[int, int] = {}
        for batch in batches:
            for src in batch["source"].to_numpy(np.int64):
                kernels.count_from_source(adj, int(src), k, counts, deadline=deadline)
        yield pd.DataFrame(
            {
                "node": pd.Series(list(counts.keys()), dtype="int64"),
                "partial": pd.Series(list(counts.values()), dtype="int64"),
            }
        )

    sources = _sources_df(spark, bc.value, k)
    partials = sources.mapInPandas(count_batches, schema="node long, partial long")
    sums = partials.groupBy("node").agg(F.sum("partial").alias("score"))
    return (
        adj_mod.nodes_df(edges_df)
        .join(sums, "node", "left")
        .select("node", F.coalesce(F.col("score"), F.lit(0)).alias("score"))
    )


def count_kcliques(
    spark: SparkSession,
    edges_df: DataFrame,
    k: int,
    ordering: DataFrame | None = None,
    budget: Budget | None = None,
) -> int:
    """Total number of k-cliques: sum of node scores divided by k
    (every clique contributes once per member)."""
    try:
        total = (
            node_clique_counts(spark, edges_df, k, ordering, budget)
            .agg(F.sum("score").alias("s"))
            .collect()[0]["s"]
        )
    except Exception as exc:  # translate budget failures from executors
        raise translate_spark_error(exc) from exc
    total = int(total or 0)
    assert total % k == 0, "sum of node scores must be divisible by k"
    n = total // k
    if budget is not None:
        budget.check_count(n)
    return n


def list_kcliques_joins(edges_df: DataFrame, k: int) -> DataFrame:
    """Catalyst-only reference listing via iterated self-joins on the
    id-oriented edge table (u < v). Output columns ``m0..m{k-1}`` in
    ascending id. O(k^2) joins — small graphs only."""
    e = edges_df.select(F.col("src").alias("a"), F.col("dst").alias("b"))
    cliques = e.select(F.col("a").alias("m0"), F.col("b").alias("m1"))
    for i in range(2, k):
        last = f"m{i-1}"
        ext = cliques.join(
            e.select(F.col("a").alias(last), F.col("b").alias(f"m{i}")), last
        )
        # The new node must be adjacent to every earlier member too.
        for j in range(i - 1):
            ext = ext.join(
                e.select(F.col("a").alias(f"m{j}"), F.col("b").alias(f"m{i}")),
                [f"m{j}", f"m{i}"],
                "left_semi",
            )
        cliques = ext.select(*[f"m{j}" for j in range(i + 1)])
    return cliques
