"""Benchmark behind Table VIII / Fig. 7: per-update latency of the
dynamic insertion/deletion algorithms (driver-side, as in the paper)."""
import numpy as np
import pytest

from repro.dynamic import index as idx_mod
from repro.dynamic import updates as upd
from repro.graphs import datasets
from repro.tables.table7 import build_state


def _workload(e, w, seed):
    g = np.random.default_rng(seed)
    idx = g.choice(len(e), size=min(w, len(e)), replace=False)
    return e[np.sort(idx)]


@pytest.mark.parametrize("name", ["FTB", "HST"])
@pytest.mark.parametrize("k", [3, 4])
def test_deletions(benchmark, name, k):
    e = datasets.edges(name)
    sel = _workload(e, 200, 5)

    def run():
        st = build_state(e, k)
        idx_mod.build_index(st)
        for u, v in sel:
            upd.delete_edge(st, int(u), int(v))
        return len(st.S)

    assert benchmark.pedantic(run, rounds=1, iterations=1) >= 0


@pytest.mark.parametrize("name", ["FTB", "HST"])
@pytest.mark.parametrize("k", [3, 4])
def test_insertions(benchmark, name, k):
    e = datasets.edges(name)
    sel = _workload(e, 200, 6)
    sel_set = {(int(u), int(v)) for u, v in sel}
    e0 = np.array(
        [(u, v) for u, v in e if (int(u), int(v)) not in sel_set], dtype=np.int64
    )

    def run():
        st = build_state(e0, k)
        idx_mod.build_index(st)
        for u, v in sel:
            upd.insert_edge(st, int(u), int(v))
        return len(st.S)

    assert benchmark.pedantic(run, rounds=1, iterations=1) >= 0
