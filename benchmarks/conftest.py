"""Benchmark-local fixtures: medium dataset handles at benchmark SF.

Benchmarks run each heavy case once (``pedantic`` with one round) —
wall-clock per table cell is what the paper reports, not microbenchmark
statistics.
"""
import pytest

from repro.graphs import datasets


@pytest.fixture(scope="session")
def bench_edges():
    """Edge arrays for the benchmark datasets (generation is memoized)."""
    return {name: datasets.edges(name) for name in ("FTB", "HST", "FBP")}
