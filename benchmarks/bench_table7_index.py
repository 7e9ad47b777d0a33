"""Benchmark behind Table VII: Spark-parallel candidate-index build."""
import pytest

from repro.dynamic import index as idx_mod
from repro.graphs import datasets
from repro.tables.table7 import build_state


@pytest.mark.parametrize("name", ["FTB", "HST"])
@pytest.mark.parametrize("k", [3, 4])
def test_index_build(benchmark, spark, name, k):
    e = datasets.edges(name)
    state = build_state(e, k)

    def build():
        state.cand.clear()
        for c in state.S:
            state.cand[c] = set()
        return idx_mod.build_index_spark(spark, state)

    size = benchmark.pedantic(build, rounds=1, iterations=1)
    assert size >= 0
