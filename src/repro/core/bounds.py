"""Possible-minimum distances (§5.3.3, Def. 5.7, Algorithm 4).

``l_s[i]`` is the smallest network distance from any PoI semantically
matching position ``i`` to any PoI semantically matching position ``i+1``;
``l_p[i]`` targets *perfect* matches of position ``i+1`` instead.  Both are
computed with the multi-source multi-destination Dijkstra of Lemma 5.9
(all sources seeded at 0 in one queue; first settled destination is the
minimum), so each needs a single graph search instead of one per source.

Algorithm 4 restricts the PoI sets to those within ``l̄(φ)`` of the start
point (the threshold for a semantic-score-0 route, known after NNinit) —
PoIs farther than that can never appear in any surviving route.

Suffix sums turn the per-leg minima into the Lemma 5.8 lower bounds:
a partial route of size ``m`` still has legs ``m→m+1, …, k-1→k`` ahead of
it, so its length grows by at least ``sum_{i=m}^{k-1} l_s[i]``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.query import QueryContext
from repro.graphs.dijkstra import dijkstra, multi_source_to_targets

INF = float("inf")


@dataclass
class MinDistBounds:
    """Per-leg minima and suffix sums; all-zero when disabled."""

    ls_leg: list[float]  # ls_leg[i]: min semantic->semantic dist of leg i->i+1 (i in 0..k-2)
    lp_leg: list[float]  # lp_leg[i]: min semantic->perfect dist of leg i->i+1
    ls_suffix: list[float]  # ls_suffix[m]: lower bound on remaining length for a size-m route
    lp_suffix: list[float]

    @classmethod
    def zeros(cls, k: int) -> "MinDistBounds":
        return cls([0.0] * max(k - 1, 0), [0.0] * max(k - 1, 0), [0.0] * (k + 1), [0.0] * (k + 1))

    @classmethod
    def compute(cls, ctx: QueryContext, threshold0: float = INF) -> "MinDistBounds":
        """Run Algorithm 4 for both the semantic- and perfect-match minima."""
        g = ctx.graph
        k = ctx.k
        if k < 2:
            return cls.zeros(k)
        if np.isfinite(threshold0):
            d0 = dijkstra(g, ctx.v_q, cutoff=threshold0)
            in_range = d0 < threshold0
        else:
            in_range = np.ones(g.n_vertices, dtype=bool)
        ls_leg, lp_leg = [], []
        for i in range(k - 1):
            srcs = [p for p in ctx.tree_pois[i] if in_range[p]]
            sem_tgts = [p for p in ctx.tree_pois[i + 1] if in_range[p]]
            perf_tgts = [p for p in ctx.perfect_pois[i + 1] if in_range[p]]
            ls = multi_source_to_targets(g, srcs, sem_tgts)
            lp = multi_source_to_targets(g, srcs, perf_tgts)
            # An unreachable leg would make every completion infeasible; keep
            # the bound finite-safe (0 contributes nothing to the sum).
            ls_leg.append(ls if np.isfinite(ls) else 0.0)
            lp_leg.append(lp if np.isfinite(lp) else 0.0)
        return cls(ls_leg, lp_leg, _suffix(ls_leg, k), _suffix(lp_leg, k))

    def remaining_ls(self, route_size: int) -> float:
        """Min extra length for a size-``m`` partial route (semantic legs)."""
        return self.ls_suffix[route_size]

    def remaining_lp(self, route_size: int) -> float:
        """Min extra length if every remaining match must be perfect."""
        return self.lp_suffix[route_size]


def _suffix(leg: list[float], k: int) -> list[float]:
    # A size-m partial route has matched 0-indexed positions 0..m-1; its
    # remaining legs are (m-1)->m, m->(m+1), ..., (k-2)->(k-1), i.e. leg
    # indices m-1..k-2 (Eq. 4 with 1-indexing shifted down).  The empty
    # route's first leg v_q -> p_1 has no Def. 5.7 minimum, so suffix[0]
    # covers legs 0..k-2 like suffix[1].
    out = []
    for m in range(k + 1):
        lo = m - 1 if m >= 1 else 0
        out.append(float(sum(leg[lo:])))
    return out
