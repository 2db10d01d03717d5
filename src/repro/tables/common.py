"""Shared experiment plumbing for the Table/Figure reproductions.

Environment knobs (all optional):

* ``REPRO_SCALE``   — dataset scale multiplier on the lite presets
  (default 1.0 for BSSR-only experiments; baseline-heavy experiments pick
  their own smaller default, mirroring the paper's own |S_q|=5 timeouts);
* ``REPRO_QUERIES`` — queries per (dataset, size) cell (paper: 100; default
  here is small so the whole suite stays minutes, not months).
"""
from __future__ import annotations

import os
import time
import tracemalloc
from collections.abc import Callable

from repro.graphs.generator import Dataset, dataset

DATASETS = ["tokyo-lite", "nyc-lite", "cal-lite"]

_ds_cache: dict[tuple[str, float], Dataset] = {}


def env_scale(default: float) -> float:
    return float(os.environ.get("REPRO_SCALE", default))


def env_queries(default: int) -> int:
    return int(os.environ.get("REPRO_QUERIES", default))


def get_dataset(name: str, scale: float) -> Dataset:
    """Presets are deterministic, so cache per (name, scale)."""
    key = (name, scale)
    if key not in _ds_cache:
        _ds_cache[key] = dataset(name, scale=scale)
    return _ds_cache[key]


def graph_mem_mb(ds: Dataset) -> float:
    """Resident bytes of the graph itself (arrays + CSR), in MB.

    tracemalloc only sees allocations made while tracing, so the statically
    held graph is added analytically to per-algorithm peaks to mirror the
    paper's process-level RSS (DESIGN.md §deviations-5).
    """
    g = ds.graph
    total = (
        g.edges_u.nbytes
        + g.edges_v.nbytes
        + g.edges_w.nbytes
        + g.xy.nbytes
        + g.cat_of.nbytes
        + sum(a.nbytes for a in g.csr())
    )
    return total / 1e6


def timed_with_peak(fn: Callable[[], object]) -> tuple[object, float, float]:
    """Run ``fn`` returning (result, seconds, traced peak MB)."""
    tracemalloc.start()
    t0 = time.perf_counter()
    try:
        out = fn()
        secs = time.perf_counter() - t0
        _cur, peak = tracemalloc.get_traced_memory()
    finally:
        tracemalloc.stop()
    return out, secs, peak / 1e6


def fmt_table(rows: list[dict], columns: list[str]) -> str:
    """Plain markdown table for job stdout / EXPERIMENTS.md."""
    widths = {
        c: max([len(c)] + [len(str(r.get(c, ""))) for r in rows]) for c in columns
    }
    head = "| " + " | ".join(c.ljust(widths[c]) for c in columns) + " |"
    sep = "|" + "|".join("-" * (widths[c] + 2) for c in columns) + "|"
    body = [
        "| " + " | ".join(str(r.get(c, "")).ljust(widths[c]) for c in columns) + " |"
        for r in rows
    ]
    return "\n".join([head, sep, *body])
