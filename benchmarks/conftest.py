"""Benchmark fixtures: small deterministic worlds per table.

Benchmarks reproduce each table's *measurement* at reduced scale; the jobs
in ``jobs/`` run the full-scale versions whose numbers EXPERIMENTS.md
records against the paper's.
"""
import pytest

from repro.tables.common import get_dataset
from repro.workloads import make_queries


@pytest.fixture(scope="session")
def bench_world():
    """Mid-size tokyo-lite for BSSR-only benchmarks."""
    ds = get_dataset("tokyo-lite", 0.3)
    return ds


@pytest.fixture(scope="session")
def bench_world_small():
    """Small tokyo-lite for baseline-including benchmarks (Dij/PNE are the
    paper's slow side — month-long at |S_q|=5 — so they get a small slice)."""
    return get_dataset("tokyo-lite", 0.08)


@pytest.fixture(scope="session")
def bench_queries(bench_world):
    return {
        size: make_queries(bench_world, size=size, n_queries=2, seed=91)
        for size in (2, 3, 4)
    }


@pytest.fixture(scope="session")
def bench_queries_small(bench_world_small):
    return {
        size: make_queries(bench_world_small, size=size, n_queries=1, seed=91)
        for size in (2, 3, 4)
    }
