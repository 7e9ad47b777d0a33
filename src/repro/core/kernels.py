"""Enumeration and search kernels over an oriented adjacency.

These are the per-source recursions every algorithm in the paper is
built from. They are plain Python/numpy so the *same* code runs

- inside Spark ``mapInPandas`` tasks (oriented adjacency arrives via a
  broadcast), for the bulk parallel phases, and
- on the driver, for the sequential greedy tails (Algorithm 1's main
  loop, Algorithm 3's ``Calculation``) and the dynamic updates.

Representation: ``adj[u]`` is a sorted ``int64`` array of the
out-neighbours of ``u`` in the DAG orientation (``eta(u) > eta(v)``),
so each k-clique is enumerated exactly once from its highest-``eta``
member (the standard kClist scheme the paper builds on). ``valid`` is
an optional boolean mask over node ids: nodes already placed in S are
masked out, which is how the framework "removes" chosen cliques
without rebuilding the graph.
"""
from __future__ import annotations

import time

import numpy as np

from repro.core.budgets import OOT_MARKER, SimulatedOOT

_EMPTY = np.empty(0, dtype=np.int64)


def _out(adj: dict[int, np.ndarray], u: int) -> np.ndarray:
    return adj.get(u, _EMPTY)


def _filter_valid(arr: np.ndarray, valid: np.ndarray | None) -> np.ndarray:
    if valid is None or len(arr) == 0:
        return arr
    return arr[valid[arr]]


def enumerate_from_source(
    adj: dict[int, np.ndarray],
    source: int,
    k: int,
    valid: np.ndarray | None = None,
    out: list | None = None,
    deadline: float | None = None,
) -> list[tuple[int, ...]]:
    """All k-cliques whose highest-``eta`` member is ``source``.

    Returns member tuples sorted by node id (the canonical clique
    identity used everywhere for tie-breaking and equality).
    """
    if out is None:
        out = []
    cand = _filter_valid(_out(adj, source), valid)
    if len(cand) < k - 1:
        return out
    _enum_rec(adj, cand, k - 1, (source,), valid, out, deadline)
    return out


def _enum_rec(adj, cand, need, prefix, valid, out, deadline):
    if deadline is not None and time.time() > deadline:
        raise SimulatedOOT(f"{OOT_MARKER}: enumeration deadline exceeded")
    if need == 1:
        for c in cand:
            out.append(tuple(sorted(prefix + (int(c),))))
        return
    for v in cand:
        nxt = np.intersect1d(cand, _filter_valid(_out(adj, int(v)), valid), assume_unique=True)
        if len(nxt) >= need - 1:
            _enum_rec(adj, nxt, need - 1, prefix + (int(v),), valid, out, deadline)


def count_from_source(
    adj: dict[int, np.ndarray],
    source: int,
    k: int,
    counts: dict[int, int],
    deadline: float | None = None,
) -> None:
    """Accumulate per-node k-clique membership counts (node scores,
    Def. 5) for all cliques rooted at ``source`` — without storing any
    clique, which is the whole point of Algorithm 3 line 2."""
    cand = _out(adj, source)
    if len(cand) < k - 1:
        return
    _count_rec(adj, cand, k - 1, [source], counts, deadline)


def _count_rec(adj, cand, need, prefix, counts, deadline):
    if deadline is not None and time.time() > deadline:
        raise SimulatedOOT(f"{OOT_MARKER}: counting deadline exceeded")
    if need == 1:
        n_here = len(cand)
        if n_here == 0:
            return
        for p in prefix:
            counts[p] = counts.get(p, 0) + n_here
        for c in cand:
            c = int(c)
            counts[c] = counts.get(c, 0) + 1
        return
    for v in cand:
        nxt = np.intersect1d(cand, _out(adj, int(v)), assume_unique=True)
        if len(nxt) >= need - 1:
            prefix.append(int(v))
            _count_rec(adj, nxt, need - 1, prefix, counts, deadline)
            prefix.pop()


def find_first_clique(
    adj: dict[int, np.ndarray],
    source: int,
    k: int,
    valid: np.ndarray | None,
) -> tuple[int, ...] | None:
    """Algorithm 1's ``FindOne``: the first k-clique encountered among
    the (still valid) out-neighbours of ``source``. Deterministic:
    candidates are scanned in ascending node id."""
    cand = _filter_valid(_out(adj, source), valid)
    if len(cand) < k - 1:
        return None
    got = _first_rec(adj, cand, k - 1, (source,), valid)
    return tuple(sorted(got)) if got is not None else None


def _first_rec(adj, cand, need, prefix, valid):
    if need == 1:
        if len(cand) == 0:
            return None
        return prefix + (int(cand[0]),)
    for v in cand:
        nxt = np.intersect1d(cand, _filter_valid(_out(adj, int(v)), valid), assume_unique=True)
        if len(nxt) >= need - 1:
            got = _first_rec(adj, nxt, need - 1, prefix + (int(v),), valid)
            if got is not None:
                return got
    return None


def find_min_clique(
    adj: dict[int, np.ndarray],
    scores: dict[int, int],
    source: int,
    k: int,
    valid: np.ndarray | None = None,
    prune: bool = True,
    stats: dict | None = None,
) -> tuple[int, tuple[int, ...]] | None:
    """Algorithm 3's ``FindMin``: the minimum-clique-score k-clique
    rooted at ``source``, with the score-driven pruning strategy.

    Total clique order is ``(s_c(C), sorted member tuple)`` — the fixed
    tie-break that makes Theorem 4 hold exactly (GC and L/LP return the
    identical S). Pruning therefore cuts a branch only when the partial
    score strictly exceeds the best score (a tie could still win on the
    member tuple), which preserves exactness of the minimum.

    Returns ``(clique_score, members)`` or None. ``stats['visited']``
    counts recursion candidates, to measure what pruning saves (L = no
    pruning vs LP = pruning; paper Fig. 6's L-vs-LP gap).
    """
    cand = _filter_valid(_out(adj, source), valid)
    if len(cand) < k - 1:
        return None
    best: list = [None, None]  # [score, members]
    s0 = scores.get(source, 0)
    _min_rec(adj, scores, cand, k - 1, (source,), s0, best, valid, prune, stats)
    if best[0] is None:
        return None
    return int(best[0]), best[1]


def _min_rec(adj, scores, cand, need, prefix, s_cur, best, valid, prune, stats):
    if stats is not None:
        stats["visited"] = stats.get("visited", 0) + len(cand)
    if need == 1:
        for c in cand:
            c = int(c)
            s = s_cur + scores.get(c, 0)
            if prune and best[0] is not None and s > best[0]:
                continue
            members = tuple(sorted(prefix + (c,)))
            if best[0] is None or (s, members) < (best[0], best[1]):
                best[0], best[1] = s, members
        return
    for v in cand:
        v = int(v)
        s_v = s_cur + scores.get(v, 0)
        # Prune: every completion adds `need - 1` more nodes with
        # scores >= s_n(v) is not guaranteed, so the sound bound is the
        # partial sum alone (as in the paper, Lines 19/27).
        if prune and best[0] is not None and s_v > best[0]:
            continue
        nxt = np.intersect1d(cand, _filter_valid(_out(adj, v), valid), assume_unique=True)
        if len(nxt) >= need - 1:
            _min_rec(adj, scores, nxt, need - 1, prefix + (v,), s_v, best, valid, prune, stats)


# ---- undirected-neighbourhood kernels (dynamic maintenance) -------------

def cliques_in_subset(
    adj_sets: dict[int, set[int]],
    allowed: set[int],
    k: int,
    containing: tuple[int, ...] = (),
    limit: int | None = None,
) -> list[tuple[int, ...]]:
    """All k-cliques whose nodes lie inside ``allowed``, optionally
    required to contain the nodes in ``containing``. Brute enumeration
    over the induced subgraph in ascending-id order — the neighbourhood
    sizes the dynamic algorithms touch are tiny (|B| <= k + k*d).
    """
    need = k - len(containing)
    base = set(containing)
    if need < 0:
        return []
    if need == 0:
        return [tuple(sorted(containing))] if _is_clique(adj_sets, base) else []
    if not _is_clique(adj_sets, base):
        return []
    cand: set[int] | None = None
    for c in containing:
        nb = adj_sets.get(c, set()) & allowed
        cand = nb if cand is None else cand & nb
    if cand is None:
        cand = set(allowed)
    cand -= base
    out: list[tuple[int, ...]] = []
    _subset_rec(adj_sets, sorted(cand), 0, need, sorted(base), out, limit)
    return out


def _subset_rec(adj_sets, cand, start, need, prefix, out, limit):
    if need == 0:
        out.append(tuple(sorted(prefix)))
        return limit is None or len(out) < limit
    for i in range(start, len(cand)):
        v = cand[i]
        nb = adj_sets.get(v, set())
        if all(p in nb for p in prefix):
            prefix.append(v)
            ok = _subset_rec(adj_sets, cand, i + 1, need - 1, prefix, out, limit)
            prefix.pop()
            if not ok:
                return False
    return True


def _is_clique(adj_sets: dict[int, set[int]], members) -> bool:
    ms = list(members)
    for i, u in enumerate(ms):
        nb = adj_sets.get(u, set())
        for v in ms[i + 1:]:
            if v not in nb:
                return False
    return True
