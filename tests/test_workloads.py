"""Query workload generation (§7.1 constraints)."""
from __future__ import annotations

import pytest

from repro.workloads import make_queries


class TestMakeQueries:
    def test_count_and_size(self, tiny_tokyo):
        qs = make_queries(tiny_tokyo, size=3, n_queries=7, seed=1, min_pois=2)
        assert len(qs) == 7
        assert all(len(q.seq_cats) == 3 for q in qs)

    def test_distinct_trees(self, tiny_tokyo):
        f = tiny_tokyo.forest
        for q in make_queries(tiny_tokyo, size=3, n_queries=10, seed=2, min_pois=2):
            trees = [f.tree_id[c] for c in q.seq_cats]
            assert len(set(trees)) == len(trees)

    def test_categories_are_popular_leaves(self, tiny_tokyo):
        f = tiny_tokyo.forest
        g = tiny_tokyo.graph
        leaves = set(f.leaves())
        for q in make_queries(tiny_tokyo, size=2, n_queries=10, seed=3, min_pois=2):
            for c in q.seq_cats:
                assert c in leaves
                assert len(g.pois_of_category(c)) >= 2

    def test_start_is_road_vertex(self, tiny_tokyo):
        for q in make_queries(tiny_tokyo, size=2, n_queries=10, seed=4, min_pois=2):
            assert 0 <= q.v_q < tiny_tokyo.graph.n_road

    def test_deterministic(self, tiny_tokyo):
        a = make_queries(tiny_tokyo, size=3, n_queries=5, seed=5, min_pois=2)
        b = make_queries(tiny_tokyo, size=3, n_queries=5, seed=5, min_pois=2)
        assert a == b

    def test_seed_and_size_vary(self, tiny_tokyo):
        a = make_queries(tiny_tokyo, size=2, n_queries=5, seed=5, min_pois=2)
        b = make_queries(tiny_tokyo, size=2, n_queries=5, seed=6, min_pois=2)
        assert a != b

    def test_impossible_size_raises(self, tiny_tokyo):
        with pytest.raises(ValueError):
            make_queries(tiny_tokyo, size=99, n_queries=1, seed=1)
