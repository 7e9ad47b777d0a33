"""HG / GC / L / LP driver-path tests: validity, maximality,
Theorem 3 (k-approximation), Theorem 4 (GC == L == LP), and the
paper's own running example."""
import pytest

from repro.core import validate
from repro.core.gc import gc_numpy, greedy_by_score
from repro.core.hg import hg_numpy
from repro.core.lp import lp_numpy

from tests.helpers import paper_fig2_edges, random_graph

GRAPHS = [(s, kind) for s in range(4) for kind in ("pp", "plc")]


@pytest.mark.parametrize("seed,kind", GRAPHS)
@pytest.mark.parametrize("k", [3, 4, 5])
def test_hg_valid_and_maximal(seed, kind, k):
    e = random_graph(seed, 40, kind)
    res = hg_numpy(e, k)
    validate.assert_valid_solution(e, k, res.S)
    assert validate.is_maximal(e, k, res.S)


@pytest.mark.parametrize("seed,kind", GRAPHS)
@pytest.mark.parametrize("k", [3, 4, 5])
def test_gc_valid_and_maximal(seed, kind, k):
    e = random_graph(seed, 40, kind)
    res = gc_numpy(e, k)
    validate.assert_valid_solution(e, k, res.S)
    assert validate.is_maximal(e, k, res.S)


@pytest.mark.parametrize("seed,kind", GRAPHS)
@pytest.mark.parametrize("k", [3, 4])
def test_theorem4_gc_equals_l_equals_lp(seed, kind, k):
    """With the fixed total clique order, Algorithm 2 and Algorithm 3
    (with or without pruning) produce the identical S — stronger than
    the paper's implementation, which relaxes tie-breaking."""
    e = random_graph(seed, 40, kind)
    g = gc_numpy(e, k)
    l_ = lp_numpy(e, k, prune=False)
    lp_ = lp_numpy(e, k, prune=True)
    assert sorted(g.S) == sorted(l_.S) == sorted(lp_.S)


@pytest.mark.parametrize("seed,kind", GRAPHS[:4])
@pytest.mark.parametrize("k", [3, 4])
def test_theorem3_k_approximation(seed, kind, k):
    """Any maximal S satisfies k * |S| >= |OPT| (Theorem 3)."""
    e = random_graph(seed, 24, kind)
    opt_size = validate.brute_force_max_disjoint(e, k)
    for res in (hg_numpy(e, k), gc_numpy(e, k), lp_numpy(e, k)):
        assert k * res.size >= opt_size


@pytest.mark.parametrize("k", [3, 4, 5])
def test_deterministic_across_runs(k):
    e = random_graph(1, 50, "plc")
    assert lp_numpy(e, k).S == lp_numpy(e, k).S
    assert gc_numpy(e, k).S == gc_numpy(e, k).S
    assert hg_numpy(e, k).S == hg_numpy(e, k).S


def test_fig2_gc_finds_maximum():
    """On the paper's running example the score-ordered greedy reaches
    the maximum (3 disjoint triangles)."""
    e = paper_fig2_edges()
    assert validate.brute_force_max_disjoint(e, 3) == 3
    g = gc_numpy(e, 3)
    assert g.size == 3
    assert set(g.S) == {(1, 3, 6), (2, 4, 9), (5, 7, 8)}
    assert sorted(lp_numpy(e, 3).S) == sorted(g.S)


def test_fig2_example2_first_found_is_selection_dependent():
    """Example 2 runs Algorithm 1 with the identity ordering. The
    paper's trace scans out-neighbourhoods in descending id and stops
    at the size-2 maximal set {(3,5,6), (7,8,9)}; our FindOne scans
    ascending id and happens to reach size 3. Both are valid
    executions — the point of the example is exactly that first-found
    selection is fragile, which motivates the score ordering."""
    import numpy as np

    from repro.core.hg import hg_driver_from_oriented
    from repro.graphs import adjacency as adj_mod

    e = paper_fig2_edges()
    rank = {v: v for v in range(1, 10)}
    adj = adj_mod.orient_by_rank(e, rank)
    res = hg_driver_from_oriented(adj, np.arange(1, 10, dtype=np.int64), 3)
    validate.assert_valid_solution(e, 3, res.S)
    assert validate.is_maximal(e, 3, res.S)
    # The paper's size-2 trace is a maximal set too: selection order,
    # not correctness, separates the two outcomes.
    paper_trace = [(3, 5, 6), (7, 8, 9)]
    validate.assert_valid_solution(e, 3, paper_trace)
    assert validate.is_maximal(e, 3, paper_trace)


def test_fig2_clique_count():
    assert gc_numpy(paper_fig2_edges(), 3).n_cliques == 7


def test_greedy_by_score_tie_break_is_member_tuple():
    scored = [(5, (4, 5, 6)), (5, (1, 2, 3)), (5, (2, 3, 4))]
    # (1,2,3) first (tie on score, smaller tuple), then (4,5,6).
    assert greedy_by_score(scored) == [(1, 2, 3), (4, 5, 6)]


def test_greedy_by_score_prefers_low_score():
    scored = [(9, (1, 2, 3)), (1, (3, 4, 5))]
    assert greedy_by_score(scored) == [(3, 4, 5)]


@pytest.mark.parametrize("k", [3, 4, 5, 6])
def test_empty_graph_and_no_cliques(k):
    import numpy as np

    e = np.array([[0, 1], [1, 2], [2, 3]], dtype=np.int64)  # path: no k-clique
    for res in (hg_numpy(e, k), gc_numpy(e, k), lp_numpy(e, k)):
        assert res.S == []


def test_single_clique_graph():
    import numpy as np

    e = np.array([[0, 1], [0, 2], [1, 2]], dtype=np.int64)
    for res in (hg_numpy(e, 3), gc_numpy(e, 3), lp_numpy(e, 3)):
        assert res.S == [(0, 1, 2)]


@pytest.mark.parametrize("seed", range(3))
def test_gc_never_smaller_than_hg_on_dense_blocks(seed):
    """The paper's headline: score ordering beats degree-ordered
    first-fit on community-structured graphs (Table II shows positive
    deltas on every real dataset). We assert it on the planted
    partition family where the effect is structural."""
    e = random_graph(seed, 60, "pp")
    assert gc_numpy(e, 3).size >= hg_numpy(e, 3).size


def test_lp_stats_populated():
    e = random_graph(2, 50, "plc")
    res = lp_numpy(e, 3)
    assert res.n_heap_init > 0
    assert res.visited > 0
    assert res.size > 0
