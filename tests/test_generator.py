"""Synthetic road networks + PoI embedding (Table 5 substrate)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.graphs.categories import foursquare_lite_forest
from repro.graphs.generator import (
    PAPER_TABLE5,
    dataset,
    graph_from_edges,
    popular_leaf_categories,
    road_network,
)


@pytest.fixture(scope="module")
def small_graph():
    return road_network(
        n_road=100, n_edges_road=130, n_pois=40, forest=foursquare_lite_forest(), seed=1
    )


def _components(graph) -> int:
    indptr, indices, _w = graph.csr()
    seen = np.zeros(graph.n_vertices, dtype=bool)
    n_comp = 0
    for s in range(graph.n_vertices):
        if seen[s]:
            continue
        n_comp += 1
        stack = [s]
        seen[s] = True
        while stack:
            u = stack.pop()
            for i in range(indptr[u], indptr[u + 1]):
                v = indices[i]
                if not seen[v]:
                    seen[v] = True
                    stack.append(v)
    return n_comp


class TestRoadNetwork:
    def test_counts(self, small_graph):
        g = small_graph
        assert g.n_road == 100
        assert g.n_pois == 40
        assert g.n_vertices == 140
        assert g.n_edges == 130 + 40  # each embedded PoI adds one net edge

    def test_connected(self, small_graph):
        assert _components(small_graph) == 1

    def test_weights_positive_and_euclidean(self, small_graph):
        g = small_graph
        assert (g.edges_w > 0).all()
        # Each edge weight equals the Euclidean gap between its endpoints
        # (PoI splitting preserves this by placing the PoI on the segment).
        d = np.linalg.norm(g.xy[g.edges_u] - g.xy[g.edges_v], axis=1)
        assert np.allclose(d, g.edges_w, rtol=1e-9, atol=1e-12)

    def test_total_length_preserved_by_embedding(self):
        f = foursquare_lite_forest()
        g0 = road_network(n_road=80, n_edges_road=100, n_pois=0, forest=f, seed=4)
        g1 = road_network(n_road=80, n_edges_road=100, n_pois=30, forest=f, seed=4)
        # Splitting an edge conserves total weight exactly.
        assert g1.edges_w.sum() == pytest.approx(g0.edges_w.sum())

    def test_determinism(self):
        f = foursquare_lite_forest()
        a = road_network(n_road=60, n_edges_road=75, n_pois=20, forest=f, seed=7)
        b = road_network(n_road=60, n_edges_road=75, n_pois=20, forest=f, seed=7)
        assert np.array_equal(a.edges_u, b.edges_u)
        assert np.array_equal(a.edges_w, b.edges_w)
        assert np.array_equal(a.cat_of, b.cat_of)

    def test_seed_changes_graph(self):
        f = foursquare_lite_forest()
        a = road_network(n_road=60, n_edges_road=75, n_pois=20, forest=f, seed=7)
        b = road_network(n_road=60, n_edges_road=75, n_pois=20, forest=f, seed=8)
        assert not np.array_equal(a.edges_w, b.edges_w)

    def test_poi_categories_are_leaves(self, small_graph):
        f = foursquare_lite_forest()
        leaves = set(f.leaves())
        cats = small_graph.cat_of[small_graph.cat_of >= 0]
        assert set(int(c) for c in cats) <= leaves

    def test_road_vertices_have_no_category(self, small_graph):
        assert (small_graph.cat_of[: small_graph.n_road] == -1).all()

    def test_too_few_edges_rejected(self):
        with pytest.raises(ValueError):
            road_network(n_road=50, n_edges_road=10, n_pois=0, forest=foursquare_lite_forest())

    def test_category_skew(self):
        """Zipf assignment: the top leaf category should hold several times
        the median count ("significantly biased", §7.1)."""
        f = foursquare_lite_forest()
        g = road_network(n_road=200, n_edges_road=260, n_pois=600, forest=f, seed=2)
        counts = np.bincount(g.cat_of[g.cat_of >= 0], minlength=f.n_categories)
        nz = counts[counts > 0]
        assert counts.max() >= 4 * np.median(nz)

    def test_csr_consistency(self, small_graph):
        indptr, indices, w = small_graph.csr()
        assert indptr[-1] == 2 * small_graph.n_edges
        degs = np.diff(indptr)
        assert degs.sum() == 2 * small_graph.n_edges


class TestPresets:
    @pytest.mark.parametrize("name", list(PAPER_TABLE5))
    def test_preset_scaled_shape(self, name):
        ds = dataset(name, scale=0.1)
        g = ds.graph
        assert _components(g) == 1
        assert g.n_pois > 0 and g.n_edges >= g.n_vertices - 1

    def test_preset_tracks_paper_ratios(self):
        """At full lite scale the |P|/|V| ratio should be within 25% of the
        paper's Table 5 ratio for each map."""
        for name, (_a, pv, pp, _pe) in PAPER_TABLE5.items():
            ds = dataset(name)
            ours = ds.graph.n_pois / ds.graph.n_road
            paper = pp / pv
            assert abs(ours - paper) / paper < 0.25, name

    def test_cal_pois_clustered(self):
        """Cal's PoIs concentrate in a small area (§7.3) — their coordinate
        spread must be well below the road vertices'."""
        ds = dataset("cal-lite", scale=0.25)
        g = ds.graph
        poi_xy = g.xy[g.poi_ids]
        road_xy = g.xy[: g.n_road]
        assert poi_xy.std(axis=0).mean() < 0.8 * road_xy.std(axis=0).mean()

    def test_unknown_preset(self):
        with pytest.raises(KeyError):
            dataset("berlin-lite")

    def test_dataset_deterministic(self):
        a = dataset("tokyo-lite", scale=0.05)
        b = dataset("tokyo-lite", scale=0.05)
        assert np.array_equal(a.graph.edges_w, b.graph.edges_w)


class TestHelpers:
    def test_graph_from_edges(self):
        g = graph_from_edges(4, [(0, 1, 1.0), (1, 2, 2.0), (2, 3, 1.5)], {3: 5})
        assert g.n_vertices == 4 and g.n_pois == 1
        assert int(g.cat_of[3]) == 5
        assert g.pois_of_category(5).tolist() == [3]

    def test_popular_leaf_categories(self, small_graph):
        f = foursquare_lite_forest()
        by_tree = popular_leaf_categories(small_graph, f, min_pois=2)
        for t, cats in by_tree.items():
            for c in cats:
                assert f.tree_id[c] == t
                assert len(small_graph.pois_of_category(c)) >= 2

    def test_pois_of_tree(self, small_graph):
        f = foursquare_lite_forest()
        all_pois = set()
        for t in range(f.n_trees):
            ps = small_graph.pois_of_tree(f, t)
            for p in ps:
                assert f.tree_id[int(small_graph.cat_of[p])] == t
            all_pois |= set(int(p) for p in ps)
        assert all_pois == set(int(p) for p in small_graph.poi_ids)

    def test_pandas_views(self, small_graph):
        e = small_graph.edges_pandas()
        p = small_graph.pois_pandas()
        assert len(e) == small_graph.n_edges
        assert len(p) == small_graph.n_pois
        assert set(p.poi_id) == set(int(x) for x in small_graph.poi_ids)
