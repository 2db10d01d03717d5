"""QueryContext — the per-query dense match/similarity tables."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.query import QueryContext
from repro.graphs.categories import foursquare_lite_forest
from repro.graphs.generator import road_network
from tests.conftest import random_query


@pytest.fixture(scope="module")
def world():
    f = foursquare_lite_forest()
    g = road_network(n_road=100, n_edges_road=130, n_pois=60, forest=f, seed=13)
    return g, f


class TestMatchTables:
    def test_sim_arr_matches_forest(self, world):
        g, f = world
        rng = np.random.default_rng(0)
        v_q, cats = random_query(g, f, rng, 3)
        ctx = QueryContext(g, f, v_q, cats)
        for i, c in enumerate(cats):
            for p in g.poi_ids:
                want = f.sim(int(g.cat_of[p]), c)
                assert ctx.sim_at(i, int(p)) == pytest.approx(want)

    def test_road_vertices_never_match(self, world):
        g, f = world
        rng = np.random.default_rng(1)
        v_q, cats = random_query(g, f, rng, 2)
        ctx = QueryContext(g, f, v_q, cats)
        for i in range(ctx.k):
            assert (ctx.sim_arrs[i][: g.n_road] == 0).all()

    def test_perfect_subset_of_tree(self, world):
        g, f = world
        rng = np.random.default_rng(2)
        v_q, cats = random_query(g, f, rng, 3)
        ctx = QueryContext(g, f, v_q, cats)
        for i in range(ctx.k):
            assert set(ctx.perfect_pois[i]) <= set(ctx.tree_pois[i])
            for p in ctx.perfect_pois[i]:
                assert ctx.is_perfect(i, int(p))

    def test_tree_pois_is_whole_tree(self, world):
        g, f = world
        rng = np.random.default_rng(3)
        v_q, cats = random_query(g, f, rng, 2)
        ctx = QueryContext(g, f, v_q, cats)
        for i, c in enumerate(cats):
            want = set(int(p) for p in g.pois_of_tree(f, f.tree_id[c]))
            assert set(int(p) for p in ctx.tree_pois[i]) == want


class TestGates:
    def test_distinct_trees_gate_on(self, world):
        g, f = world
        rng = np.random.default_rng(4)
        v_q, cats = random_query(g, f, rng, 3)
        assert QueryContext(g, f, v_q, cats).trees_distinct

    def test_repeated_tree_gate_off(self, world):
        g, f = world
        leaves0 = [c for c in f.leaves_of_tree(0) if len(g.pois_of_category(c))]
        if len(leaves0) < 2:
            pytest.skip("need two populated leaves in one tree")
        ctx = QueryContext(g, f, 0, [leaves0[0], leaves0[1]])
        assert not ctx.trees_distinct


class TestNonperfectBounds:
    def test_max_nonperfect_is_category_level(self, world):
        g, f = world
        leaf = f.leaves_of_tree(0)[0]
        ctx = QueryContext(g, f, 0, [leaf])
        # For a depth-3 leaf the best non-equal category is its parent: 0.8.
        assert ctx.max_nonperfect[0] == pytest.approx(f.max_nonperfect_sim(leaf))

    def test_suffix_is_max_over_remaining(self, world):
        g, f = world
        rng = np.random.default_rng(5)
        v_q, cats = random_query(g, f, rng, 3)
        ctx = QueryContext(g, f, v_q, cats)
        for pos in range(ctx.k + 1):
            want = max(ctx.max_nonperfect[pos:], default=0.0)
            assert ctx.max_nonperfect_suffix(pos) == pytest.approx(want)

    def test_suffix_bound_dominates_achievable(self, world):
        """Any non-perfect single-position match factor achievable by an
        actual PoI must be <= the category-level bound (Lemma 5.8 safety)."""
        g, f = world
        rng = np.random.default_rng(6)
        v_q, cats = random_query(g, f, rng, 3)
        ctx = QueryContext(g, f, v_q, cats)
        for i in range(ctx.k):
            sims = ctx.sim_arrs[i][ctx.tree_pois[i]]
            nonperf = sims[sims < 1.0]
            if len(nonperf):
                assert nonperf.max() <= ctx.max_nonperfect[i] + 1e-12
