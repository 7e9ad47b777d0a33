"""Shared harness plumbing: timed runs and budget-to-cell mapping."""
from __future__ import annotations

import time


from repro.core.budgets import Budget, SimulatedOOM, SimulatedOOT

# Default budgets for harness cells: a cell becomes OOM past this many
# materialized cliques (GC / OPT's clique graph), OOT past the wall
# budget. Scaled-down analogues of the paper's 504 GB / 24 h.
DEFAULT_MAX_CLIQUES = 3_000_000
DEFAULT_MAX_SECONDS = 300.0


def fresh_budget(max_cliques=DEFAULT_MAX_CLIQUES, max_seconds=DEFAULT_MAX_SECONDS) -> Budget:
    return Budget(max_cliques=max_cliques, max_seconds=max_seconds)


def run_cell(fn, *args, **kwargs):
    """Run one harness cell; returns (status, result, seconds)."""
    t0 = time.monotonic()
    try:
        out = fn(*args, **kwargs)
        return "OK", out, time.monotonic() - t0
    except SimulatedOOM:
        return "OOM", None, time.monotonic() - t0
    except SimulatedOOT:
        return "OOT", None, time.monotonic() - t0


def cell(status: str, value) -> str:
    """Format a table cell the way the paper does."""
    return str(value) if status == "OK" else status
