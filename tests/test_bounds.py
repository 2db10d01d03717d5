"""Possible-minimum distances (§5.3.3, Def. 5.7, Algorithm 4, Lemma 5.9)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.bounds import MinDistBounds
from repro.core.query import QueryContext
from repro.graphs.dijkstra import floyd_warshall_reference
from tests.conftest import random_query

INF = float("inf")


def _brute_leg_min(graph, srcs, tgts) -> float:
    if len(srcs) == 0 or len(tgts) == 0:
        return 0.0
    ref = floyd_warshall_reference(graph)
    m = float(ref[np.ix_(list(srcs), list(tgts))].min())
    return m if np.isfinite(m) else 0.0


class TestLegMinima:
    @pytest.mark.parametrize("seed", range(5))
    def test_ls_matches_brute(self, random_world_factory, seed):
        g, f, rng = random_world_factory(seed, n_road=60, n_pois=40)
        v_q, cats = random_query(g, f, rng, 3)
        ctx = QueryContext(g, f, v_q, cats)
        b = MinDistBounds.compute(ctx)
        for i in range(ctx.k - 1):
            want = _brute_leg_min(g, ctx.tree_pois[i], ctx.tree_pois[i + 1])
            assert b.ls_leg[i] == pytest.approx(want)

    @pytest.mark.parametrize("seed", range(5))
    def test_lp_matches_brute(self, random_world_factory, seed):
        g, f, rng = random_world_factory(seed, n_road=60, n_pois=40)
        v_q, cats = random_query(g, f, rng, 3)
        ctx = QueryContext(g, f, v_q, cats)
        b = MinDistBounds.compute(ctx)
        for i in range(ctx.k - 1):
            want = _brute_leg_min(g, ctx.tree_pois[i], ctx.perfect_pois[i + 1])
            assert b.lp_leg[i] == pytest.approx(want)

    def test_lp_geq_ls(self, random_world_factory):
        """Perfect targets are a subset of semantic targets, so the
        perfect-match minimum can only be larger (§5.3.3)."""
        for seed in range(5):
            g, f, rng = random_world_factory(seed)
            v_q, cats = random_query(g, f, rng, 3)
            ctx = QueryContext(g, f, v_q, cats)
            b = MinDistBounds.compute(ctx)
            for i in range(ctx.k - 1):
                assert b.lp_leg[i] >= b.ls_leg[i] - 1e-12


class TestSuffixSums:
    def test_indexing(self):
        b = MinDistBounds(
            ls_leg=[1.0, 2.0, 4.0], lp_leg=[1.5, 2.5, 4.5],
            ls_suffix=[], lp_suffix=[],
        )
        from repro.core.bounds import _suffix

        ls = _suffix(b.ls_leg, 4)
        # size-0/1 routes still face all legs; size-2 faces legs 1,2; ...
        assert ls == [7.0, 7.0, 6.0, 4.0, 0.0]

    def test_k1_zero(self):
        b = MinDistBounds.zeros(1)
        assert b.remaining_ls(0) == 0.0
        assert b.remaining_ls(1) == 0.0

    def test_remaining_decreases_with_size(self, random_world_factory):
        g, f, rng = random_world_factory(1)
        v_q, cats = random_query(g, f, rng, 3)
        ctx = QueryContext(g, f, v_q, cats)
        b = MinDistBounds.compute(ctx)
        vals = [b.remaining_ls(m) for m in range(ctx.k + 1)]
        assert all(vals[i] >= vals[i + 1] - 1e-12 for i in range(len(vals) - 1))
        assert vals[-1] == 0.0


class TestThresholdRestriction:
    def test_restriction_can_only_raise_minima(self, random_world_factory):
        """Restricting to PoIs within l̄(φ) of v_q (Algorithm 4 lines 3–4)
        shrinks both sets, so leg minima cannot decrease."""
        g, f, rng = random_world_factory(2)
        v_q, cats = random_query(g, f, rng, 3)
        ctx = QueryContext(g, f, v_q, cats)
        free = MinDistBounds.compute(ctx)
        from repro.graphs.dijkstra import dijkstra

        d0 = dijkstra(g, v_q)
        radius = float(np.median(d0[np.isfinite(d0)]))
        in_range = d0 < radius
        if any(
            not in_range[ctx.tree_pois[i]].any() or not in_range[ctx.tree_pois[i + 1]].any()
            for i in range(ctx.k - 1)
        ):
            pytest.skip("radius empties a PoI set; the bound degrades to 0 by design")
        tight = MinDistBounds.compute(ctx, radius)
        for i in range(ctx.k - 1):
            assert tight.ls_leg[i] >= free.ls_leg[i] - 1e-12

    def test_zeros_factory(self):
        b = MinDistBounds.zeros(4)
        assert b.ls_leg == [0.0] * 3
        assert b.remaining_lp(2) == 0.0
