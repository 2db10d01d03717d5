"""The paper's naive SkySR solution (§4): one OSR query per super-category
sequence of ``S_q``, then a skyline pass over the candidates.

A super-category sequence replaces each position's category with itself or
one of its ancestors (Def. 3.1); matching a position then means "PoI whose
category lies in the subtree of that ancestor" (a PoI associated with ``c``
is associated with all ancestors of ``c``).  The number of sequences is
``prod_i depth(c_i)`` — the exponential blow-up that motivates BSSR.

Each candidate route's *actual* scores are computed from its PoIs' real
categories (Eq. 6/7) before the skyline pass.  This reproduces the paper's
baseline faithfully; see DESIGN.md §deviations-4 for the exactness caveat on
trees deeper than 2.
"""
from __future__ import annotations

import itertools
from collections.abc import Callable, Sequence

import numpy as np

from repro.baselines.osr import osr_dijkstra, osr_pne
from repro.core.dominance import skyline
from repro.core.query import QueryContext
from repro.core.scores import semantic_score
from repro.graphs.categories import CategoryForest
from repro.graphs.generator import Graph


def super_category_sequences(forest: CategoryForest, seq_cats: Sequence[int]) -> list[tuple[int, ...]]:
    """All super-category sequences of ``S_q`` (Def. 3.1)."""
    choices = [list(forest.ancestors(c)) for c in seq_cats]
    return [tuple(combo) for combo in itertools.product(*choices)]


def subtree_match_set(graph: Graph, forest: CategoryForest, anc: int) -> np.ndarray:
    """PoIs associated with ``anc`` — i.e. whose category has ``anc`` as an
    ancestor (including itself)."""
    ok = np.zeros(forest.n_categories, dtype=bool)
    for c in range(forest.n_categories):
        if anc in forest.ancestors(c):
            ok[c] = True
    mask = graph.cat_of >= 0
    out = np.zeros(graph.n_vertices, dtype=bool)
    out[mask] = ok[graph.cat_of[mask]]
    return np.nonzero(out)[0]


def naive_skysr(
    graph: Graph,
    forest: CategoryForest,
    v_q: int,
    seq_cats: list[int],
    *,
    engine: str = "dijkstra",  # "dijkstra" (Dij) | "pne" (PNE)
    destination: int | None = None,
    stats: dict | None = None,
) -> list[tuple[float, float, tuple[int, ...]]]:
    """Candidates from every super-category sequence, skyline-filtered.

    Returns ``(l, s, route)`` rows like :func:`repro.core.bssr.bssr`.
    """
    ctx = QueryContext(graph, forest, v_q, seq_cats, destination)
    osr: Callable = osr_dijkstra if engine == "dijkstra" else osr_pne
    match_cache: dict[int, np.ndarray] = {}
    candidates: list[tuple[float, float, tuple[int, ...]]] = []
    n_osr = 0
    for sseq in super_category_sequences(forest, seq_cats):
        sets = []
        for anc in sseq:
            if anc not in match_cache:
                match_cache[anc] = subtree_match_set(graph, forest, anc)
            sets.append(match_cache[anc])
        if destination is not None:
            # §6 destination variant, kept *exact* for the baseline: the
            # destination is one more position with a single matching
            # vertex, so the OSR minimizes the total including that leg.
            sets.append(np.array([destination], dtype=np.int64))
        n_osr += 1
        hit = osr(graph, v_q, sets, stats=stats)
        if hit is None:
            continue
        length, route = hit
        if destination is not None:
            route = route[:-1]
        prod = 1.0
        for pos, p in enumerate(route):
            prod *= ctx.sim_at(pos, p)
        candidates.append((length, semantic_score(prod), route))
    if stats is not None:
        stats["osr_queries"] = n_osr
    return skyline(candidates)
