"""Benchmark behind Table I: distributed k-clique counting."""
import pytest

from repro.core import clique_listing
from repro.graphs import datasets


@pytest.mark.parametrize("name", ["FTB", "HST"])
@pytest.mark.parametrize("k", [3, 4, 5])
def test_count_kcliques(benchmark, spark, name, k):
    df = datasets.spark_edges(spark, name).cache()
    df.count()
    result = benchmark.pedantic(
        clique_listing.count_kcliques, args=(spark, df, k), rounds=1, iterations=1
    )
    assert result >= 0
