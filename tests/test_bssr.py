"""BSSR (Algorithms 1–2 + §5.3 optimizations) vs brute-force ground truth.

Theorem 3 (exactness) must hold under *every* optimization flag
combination, on distinct-tree and repeated-tree queries, with and without a
destination, over both forest shapes.
"""
from __future__ import annotations

import itertools

import numpy as np
import pytest

from repro.baselines.brute import brute_force_skysr, score_set
from repro.core.bssr import BSSROptions, bssr, bssr_first_scan
from repro.core.scores import is_sequenced_route, route_scores
from tests.conftest import random_query

ALL_FLAG_COMBOS = [
    BSSROptions(use_nninit=nn, pq_mode=pq, use_min_dist=md, use_cache=ca)
    for nn, pq, md, ca in itertools.product(
        [True, False], ["proposed", "distance"], [True, False], [True, False]
    )
]


class TestExactnessRandomized:
    @pytest.mark.parametrize("seed", range(8))
    @pytest.mark.parametrize("size", [2, 3])
    def test_matches_brute_force_foursquare(self, random_world_factory, seed, size):
        g, f, rng = random_world_factory(seed)
        v_q, cats = random_query(g, f, rng, size)
        want = score_set(brute_force_skysr(g, f, v_q, cats))
        got = bssr(g, f, v_q, cats)
        assert got.score_set() == want

    @pytest.mark.parametrize("seed", range(4))
    def test_matches_brute_force_depth2(self, random_world_factory, seed):
        g, f, rng = random_world_factory(seed, depth2=True)
        v_q, cats = random_query(g, f, rng, 3)
        want = score_set(brute_force_skysr(g, f, v_q, cats))
        assert bssr(g, f, v_q, cats).score_set() == want

    @pytest.mark.parametrize("seed", range(3))
    def test_matches_brute_force_cal_forest(self, tiny_cal, seed):
        ds = tiny_cal
        rng = np.random.default_rng(seed)
        v_q, cats = random_query(ds.graph, ds.forest, rng, 2)
        want = score_set(brute_force_skysr(ds.graph, ds.forest, v_q, cats))
        assert bssr(ds.graph, ds.forest, v_q, cats).score_set() == want

    @pytest.mark.parametrize("combo_idx", range(len(ALL_FLAG_COMBOS)))
    def test_every_flag_combo_is_exact(self, random_world_factory, combo_idx):
        opts = ALL_FLAG_COMBOS[combo_idx]
        g, f, rng = random_world_factory(42)
        v_q, cats = random_query(g, f, rng, 3)
        want = score_set(brute_force_skysr(g, f, v_q, cats))
        got = bssr(g, f, v_q, cats, options=opts)
        assert got.score_set() == want, opts

    @pytest.mark.parametrize("seed", range(4))
    def test_repeated_tree_queries(self, random_world_factory, seed):
        """Same tree twice in S_q — Lemma 5.5/caching auto-disable path."""
        g, f, rng = random_world_factory(seed)
        v_q, cats = random_query(g, f, rng, 3, distinct_trees=False)
        want = score_set(brute_force_skysr(g, f, v_q, cats))
        got = bssr(g, f, v_q, cats)
        assert got.score_set() == want

    @pytest.mark.parametrize("seed", range(4))
    def test_destination_variant(self, random_world_factory, seed):
        """§6 extension: a final leg to a fixed destination."""
        g, f, rng = random_world_factory(seed)
        v_q, cats = random_query(g, f, rng, 2)
        dest = int(rng.integers(0, g.n_road))
        want = score_set(brute_force_skysr(g, f, v_q, cats, destination=dest))
        got = bssr(g, f, v_q, cats, destination=dest)
        assert got.score_set() == want


class TestOutputValidity:
    @pytest.mark.parametrize("seed", range(5))
    def test_routes_are_valid_with_exact_scores(self, random_world_factory, seed):
        g, f, rng = random_world_factory(seed)
        v_q, cats = random_query(g, f, rng, 3)
        res = bssr(g, f, v_q, cats)
        assert len(res.routes) >= 1
        for l, s, r in res.routes:
            assert is_sequenced_route(g, f, cats, r)
            l2, s2 = route_scores(g, f, v_q, cats, r)
            assert l == pytest.approx(l2)
            assert s == pytest.approx(s2)

    def test_result_is_minimal(self, random_world_factory):
        from repro.core.dominance import dominates

        g, f, rng = random_world_factory(3)
        v_q, cats = random_query(g, f, rng, 3)
        res = bssr(g, f, v_q, cats)
        scores = [(l, s) for (l, s, _r) in res.routes]
        for i, a in enumerate(scores):
            for j, b in enumerate(scores):
                if i != j:
                    assert not dominates(a, b)
                    assert a != b  # minimal: no equivalents either

    def test_contains_perfect_route_when_one_exists(self, random_world_factory):
        g, f, rng = random_world_factory(5)
        v_q, cats = random_query(g, f, rng, 2)
        bf = brute_force_skysr(g, f, v_q, cats)
        if any(s == 0.0 for (_l, s, _r) in bf):
            res = bssr(g, f, v_q, cats)
            assert any(s == 0.0 for (_l, s, _r) in res.routes)


class TestInstrumentation:
    def test_counters_populated(self, tiny_tokyo):
        ds = tiny_tokyo
        rng = np.random.default_rng(0)
        v_q, cats = random_query(ds.graph, ds.forest, rng, 3)
        res = bssr(ds.graph, ds.forest, v_q, cats)
        st = res.stats
        assert st.visited_vertices > 0
        assert st.mdijkstra_runs >= 1
        assert st.mdijkstra_requests >= st.mdijkstra_runs
        assert st.first_weight_sum > 0
        assert st.n_results == len(res.routes)
        assert st.total_time_ms > 0

    def test_cache_reduces_runs(self, tiny_tokyo):
        ds = tiny_tokyo
        rng = np.random.default_rng(1)
        v_q, cats = random_query(ds.graph, ds.forest, rng, 3)
        with_cache = bssr(ds.graph, ds.forest, v_q, cats).stats
        no_cache = bssr(
            ds.graph, ds.forest, v_q, cats, options=BSSROptions(use_cache=False)
        ).stats
        assert with_cache.mdijkstra_runs <= no_cache.mdijkstra_runs
        assert with_cache.cache_hits >= 0

    def test_nninit_reduces_first_scan(self, tiny_tokyo):
        """Table 7's core claim: the seeded first search scans far less edge
        weight than the unseeded one."""
        ds = tiny_tokyo
        rng = np.random.default_rng(2)
        v_q, cats = random_query(ds.graph, ds.forest, rng, 3)
        seeded = bssr_first_scan(ds.graph, ds.forest, v_q, cats)
        unseeded = bssr_first_scan(ds.graph, ds.forest, v_q, cats, use_nninit=False)
        assert seeded.first_weight_sum <= unseeded.first_weight_sum
        assert unseeded.first_weight_sum == pytest.approx(
            2 * ds.graph.edges_w.sum(), rel=0.2
        )  # unbounded scan sweeps ~every edge from both sides

    def test_first_scan_matches_full_run(self, tiny_tokyo):
        ds = tiny_tokyo
        rng = np.random.default_rng(3)
        v_q, cats = random_query(ds.graph, ds.forest, rng, 2)
        fast = bssr_first_scan(ds.graph, ds.forest, v_q, cats)
        full = bssr(ds.graph, ds.forest, v_q, cats).stats
        assert fast.first_weight_sum == pytest.approx(full.first_weight_sum)

    def test_proposed_pq_visits_no_more(self, tiny_tokyo):
        """Table 8's direction on a realistic slice (aggregate over a few
        queries to smooth noise)."""
        ds = tiny_tokyo
        rng = np.random.default_rng(4)
        tot = {"proposed": 0, "distance": 0}
        for _ in range(4):
            v_q, cats = random_query(ds.graph, ds.forest, rng, 3)
            for mode in tot:
                r = bssr(
                    ds.graph, ds.forest, v_q, cats, options=BSSROptions(pq_mode=mode)
                )
                tot[mode] += r.stats.visited_vertices
        assert tot["proposed"] <= tot["distance"] * 1.05


class TestDegenerateQueries:
    def test_single_category(self, random_world_factory):
        g, f, rng = random_world_factory(6)
        v_q, cats = random_query(g, f, rng, 1)
        want = score_set(brute_force_skysr(g, f, v_q, cats))
        assert bssr(g, f, v_q, cats).score_set() == want

    def test_category_with_no_pois(self, random_world_factory):
        g, f, rng = random_world_factory(7)
        # A leaf category whose tree has no PoIs at all -> empty result.
        counts = np.bincount(g.cat_of[g.cat_of >= 0], minlength=f.n_categories)
        tree_counts = {}
        for c in range(f.n_categories):
            tree_counts[f.tree_id[c]] = tree_counts.get(f.tree_id[c], 0) + counts[c]
        empty_trees = [t for t, n in tree_counts.items() if n == 0]
        if not empty_trees:
            pytest.skip("all trees populated in this world")
        cat = next(c for c in f.leaves() if f.tree_id[c] == empty_trees[0])
        res = bssr(g, f, 0, [cat])
        assert res.routes == []

    def test_start_on_poi_vertex(self, random_world_factory):
        g, f, rng = random_world_factory(8)
        _v, cats = random_query(g, f, rng, 2)
        v_q = int(g.poi_ids[0])
        want = score_set(brute_force_skysr(g, f, v_q, cats))
        assert bssr(g, f, v_q, cats).score_set() == want
