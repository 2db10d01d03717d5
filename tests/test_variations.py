"""§6 variations: directed graphs and multi-category PoIs, end-to-end.

The destination variant and repeated-tree sequences are covered in
test_bssr.py; here the remaining implemented variations get their own
brute-force-checked suites.
"""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.brute import brute_force_skysr, score_set
from repro.core.bssr import bssr
from repro.core.query import QueryContext
from repro.graphs.categories import foursquare_lite_forest
from repro.graphs.dijkstra import dijkstra, floyd_warshall_reference
from repro.graphs.generator import graph_from_edges, road_network


def _directed_world(seed: int):
    """Random directed graph built from an undirected base plus extra
    one-way shortcuts (keeps strong connectivity via the doubled base)."""
    f = foursquare_lite_forest()
    base = road_network(n_road=70, n_edges_road=90, n_pois=40, forest=f, seed=seed)
    rng = np.random.default_rng(seed)
    eu = np.concatenate([base.edges_u, base.edges_v])
    ev = np.concatenate([base.edges_v, base.edges_u])
    ew = np.concatenate([base.edges_w, base.edges_w])
    # Drop ~20% of one-way copies: asymmetric but still strongly connected
    # in practice (verified by the tests via reachability of results).
    keep = rng.random(len(eu)) > 0.2
    keep[: len(base.edges_u)] |= ~keep[len(base.edges_u):]  # never drop both copies
    edges = [(int(u), int(v), float(w)) for u, v, w, k in zip(eu, ev, ew, keep) if k]
    g = graph_from_edges(
        base.n_vertices,
        edges,
        {int(p): int(base.cat_of[p]) for p in base.poi_ids},
        n_road=base.n_road,
        directed=True,
    )
    return g, f, rng


class TestDirectedGraphs:
    @pytest.mark.parametrize("seed", range(4))
    def test_bssr_matches_brute(self, seed):
        from tests.conftest import random_query

        g, f, rng = _directed_world(seed)
        v_q, cats = random_query(g, f, rng, 2)
        want = score_set(brute_force_skysr(g, f, v_q, cats))
        assert bssr(g, f, v_q, cats).score_set() == want

    @pytest.mark.parametrize("seed", range(2))
    def test_destination_on_directed(self, seed):
        from tests.conftest import random_query

        g, f, rng = _directed_world(seed + 10)
        v_q, cats = random_query(g, f, rng, 2)
        dest = int(rng.integers(0, g.n_road))
        want = score_set(brute_force_skysr(g, f, v_q, cats, destination=dest))
        assert bssr(g, f, v_q, cats, destination=dest).score_set() == want

    def test_asymmetric_distances(self):
        g = graph_from_edges(3, [(0, 1, 1.0), (1, 2, 1.0), (2, 0, 1.0)], {}, directed=True)
        d = dijkstra(g, 0)
        assert d[1] == 1.0 and d[2] == 2.0
        dr = dijkstra(g, 0, reverse=True)
        assert dr[2] == 1.0 and dr[1] == 2.0  # distances TO vertex 0

    def test_floyd_warshall_directed(self):
        g = graph_from_edges(3, [(0, 1, 1.0), (1, 2, 1.0), (2, 0, 1.0)], {}, directed=True)
        ref = floyd_warshall_reference(g)
        assert ref[0, 2] == 2.0 and ref[2, 0] == 1.0

    def test_spark_engines_on_directed(self, spark):
        from repro.graphs.sssp_spark import (
            bellman_ford_sssp,
            edges_bidirectional,
            partitioned_dijkstra,
        )

        g = graph_from_edges(4, [(0, 1, 1.0), (1, 2, 1.0), (2, 3, 1.0), (3, 0, 1.0)], {}, directed=True)
        ref = dijkstra(g, 0)
        got_p = {
            int(r["vertex"]): float(r["dist"])
            for r in partitioned_dijkstra(spark, g, [0]).collect()
        }
        got_b = {
            int(r["vertex"]): float(r["dist"])
            for r in bellman_ford_sssp(spark, edges_bidirectional(spark, g), [0]).collect()
        }
        for v in range(4):
            assert got_p[v] == pytest.approx(ref[v])
            assert got_b[v] == pytest.approx(ref[v])


class TestMultiCategoryPoIs:
    @pytest.fixture(scope="class")
    def world(self):
        f = foursquare_lite_forest()
        food = f.leaves_of_tree(0)
        shop = f.leaves_of_tree(1)
        # PoI 3 is primarily a shop leaf but ALSO an exact food match —
        # closer than the pure food PoI 4.
        g = graph_from_edges(
            5,
            [(0, 1, 1.0), (1, 2, 1.0), (2, 3, 1.0), (3, 4, 1.0)],
            {3: shop[1], 4: food[0], 1: shop[0]},
            extra_cats={3: [food[0]]},
        )
        return g, f, food, shop

    def test_sim_uses_best_category(self, world):
        g, f, food, shop = world
        ctx = QueryContext(g, f, 0, [food[0]])
        assert ctx.sim_at(0, 3) == 1.0  # via extra category
        assert ctx.sim_at(0, 4) == 1.0
        assert 3 in set(ctx.perfect_pois[0])

    def test_bssr_matches_brute_with_extra_cats(self, world):
        g, f, food, shop = world
        cats = [food[0], shop[0]]
        want = score_set(brute_force_skysr(g, f, 0, cats))
        got = bssr(g, f, 0, cats)
        assert got.score_set() == want

    def test_overlapping_match_sets_disable_cache_gate(self, world):
        """PoI 3 matches both query positions -> the disjointness gate must
        switch Lemma 5.5/caching off (DESIGN.md §deviations-3)."""
        g, f, food, shop = world
        ctx = QueryContext(g, f, 0, [food[0], shop[1]])
        assert 3 in set(ctx.tree_pois[0]) and 3 in set(ctx.tree_pois[1])
        assert not ctx.trees_distinct

    def test_distinct_gate_for_plain_queries(self, world):
        g, f, food, shop = world
        ctx = QueryContext(g, f, 0, [food[1], shop[0]])
        # PoI 3's extra food category overlaps the food tree: gate off.
        assert not ctx.trees_distinct

    def test_multi_category_shortens_route(self, world):
        """With PoI 3 counting as food, <3, ...> beats going out to 4."""
        g, f, food, shop = world
        res = bssr(g, f, 0, [food[0], shop[0]])
        best_perfect = min((l for l, s, _r in res.routes if s == 0.0), default=None)
        assert best_perfect is not None
        # 0->3 (food via extra cat) = 3, then 3->1 (shop) = 2 -> total 5;
        # vs 0->4 = 4, 4->1 = 3 -> 7.
        assert best_perfect == pytest.approx(5.0)
