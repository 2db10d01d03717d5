"""OSR engines (Dij / PNE) and the naive super-sequence SkySR baseline."""
from __future__ import annotations

import itertools

import numpy as np
import pytest

from repro.baselines.brute import brute_force_skysr, score_set
from repro.baselines.naive import (
    naive_skysr,
    subtree_match_set,
    super_category_sequences,
)
from repro.baselines.osr import osr_dijkstra, osr_pne
from repro.core.bssr import bssr
from repro.core.query import QueryContext
from repro.graphs.dijkstra import dijkstra
from tests.conftest import random_query


def brute_osr(graph, v_q, match_sets):
    """Reference OSR: enumerate all distinct PoI tuples."""
    best = None
    rows = {v_q: dijkstra(graph, v_q)}
    for m in match_sets:
        for p in m:
            p = int(p)
            if p not in rows:
                rows[p] = dijkstra(graph, p)
    for combo in itertools.product(*[list(map(int, m)) for m in match_sets]):
        if len(set(combo)) != len(combo):
            continue
        length = rows[v_q][combo[0]]
        prev = combo[0]
        for p in combo[1:]:
            length += rows[prev][p]
            prev = p
        if np.isfinite(length) and (best is None or length < best[0]):
            best = (float(length), combo)
    return best


class TestOSREngines:
    @pytest.mark.parametrize("engine", [osr_dijkstra, osr_pne])
    @pytest.mark.parametrize("seed", range(5))
    def test_optimal_length(self, random_world_factory, engine, seed):
        g, f, rng = random_world_factory(seed, n_road=80, n_pois=50)
        v_q, cats = random_query(g, f, rng, 3)
        ctx = QueryContext(g, f, v_q, cats)
        sets = [ctx.perfect_pois[i] for i in range(ctx.k)]
        if any(len(s) == 0 for s in sets):
            pytest.skip("a position has no perfect match")
        want = brute_osr(g, v_q, sets)
        got = engine(g, v_q, sets)
        assert (got is None) == (want is None)
        if want is not None:
            assert got[0] == pytest.approx(want[0])

    @pytest.mark.parametrize("seed", range(3))
    def test_engines_agree(self, random_world_factory, seed):
        g, f, rng = random_world_factory(seed + 10, n_road=80, n_pois=50)
        v_q, cats = random_query(g, f, rng, 2)
        ctx = QueryContext(g, f, v_q, cats)
        sets = [ctx.tree_pois[i] for i in range(ctx.k)]
        a = osr_dijkstra(g, v_q, sets)
        b = osr_pne(g, v_q, sets)
        assert (a is None) == (b is None)
        if a is not None:
            assert a[0] == pytest.approx(b[0])

    def test_empty_match_set(self, random_world_factory):
        g, _f, _rng = random_world_factory(0)
        assert osr_dijkstra(g, 0, [np.array([], dtype=np.int64)]) is None
        assert osr_pne(g, 0, [np.array([], dtype=np.int64)]) is None

    def test_route_is_returned_in_order(self, random_world_factory):
        g, f, rng = random_world_factory(2)
        v_q, cats = random_query(g, f, rng, 3)
        ctx = QueryContext(g, f, v_q, cats)
        sets = [ctx.tree_pois[i] for i in range(ctx.k)]
        hit = osr_dijkstra(g, v_q, sets)
        assert hit is not None
        _l, route = hit
        for pos, p in enumerate(route):
            assert p in set(int(x) for x in sets[pos])

    def test_queue_peak_stat(self, random_world_factory):
        g, f, rng = random_world_factory(3)
        v_q, cats = random_query(g, f, rng, 2)
        ctx = QueryContext(g, f, v_q, cats)
        sets = [ctx.tree_pois[i] for i in range(ctx.k)]
        sd, sp = {}, {}
        osr_dijkstra(g, v_q, sets, stats=sd)
        osr_pne(g, v_q, sets, stats=sp)
        # The Table 6 mechanism: Dij's route queue dwarfs PNE's.
        assert sd["queue_peak"] >= sp["queue_peak"]


class TestSuperSequences:
    def test_count_is_product_of_depths(self, random_world_factory):
        _g, f, _rng = random_world_factory(0)
        cats = [f.leaves_of_tree(0)[0], f.leaves_of_tree(1)[0]]
        seqs = super_category_sequences(f, cats)
        assert len(seqs) == f.depth[cats[0]] * f.depth[cats[1]]
        assert (cats[0], cats[1]) in seqs

    def test_each_position_is_ancestor(self, random_world_factory):
        _g, f, _rng = random_world_factory(0)
        cats = [f.leaves_of_tree(2)[3], f.leaves_of_tree(4)[1]]
        for sseq in super_category_sequences(f, cats):
            for anc, c in zip(sseq, cats):
                assert anc in f.ancestors(c)

    def test_subtree_match_set(self, random_world_factory):
        g, f, _rng = random_world_factory(1)
        root0 = 0
        got = set(int(p) for p in subtree_match_set(g, f, root0))
        want = set(int(p) for p in g.pois_of_tree(f, 0))
        assert got == want  # root closure == whole tree

    def test_subtree_match_leaf_is_exact(self, random_world_factory):
        g, f, _rng = random_world_factory(1)
        leaf = f.leaves_of_tree(0)[0]
        got = set(int(p) for p in subtree_match_set(g, f, leaf))
        assert got == set(int(p) for p in g.pois_of_category(leaf))


class TestNaiveSkySR:
    @pytest.mark.parametrize("engine", ["dijkstra", "pne"])
    @pytest.mark.parametrize("seed", range(4))
    def test_depth2_equals_bssr_and_brute(self, random_world_factory, engine, seed):
        """On depth-2 forests the naive baseline is provably exact
        (DESIGN.md §deviations-4): all three methods must agree."""
        g, f, rng = random_world_factory(seed, depth2=True)
        v_q, cats = random_query(g, f, rng, 3)
        want = score_set(brute_force_skysr(g, f, v_q, cats))
        nv = score_set(naive_skysr(g, f, v_q, cats, engine=engine))
        bs = bssr(g, f, v_q, cats).score_set()
        assert bs == want
        assert nv == want

    @pytest.mark.parametrize("seed", range(3))
    def test_deep_trees_subset_of_candidates(self, random_world_factory, seed):
        """On deeper forests the naive result is a set of genuine sequenced
        routes whose perfect-match candidate always appears; every naive
        route must be undominated within the naive candidate set and never
        dominate a BSSR skyline member."""
        from repro.core.dominance import dominates

        g, f, rng = random_world_factory(seed)
        v_q, cats = random_query(g, f, rng, 2)
        nv = naive_skysr(g, f, v_q, cats, engine="dijkstra")
        truth = bssr(g, f, v_q, cats).routes
        for l, s, _r in nv:
            assert not any(dominates((l, s), (tl, ts)) for (tl, ts, _tr) in truth)

    def test_osr_query_count_matches_enumeration(self, random_world_factory):
        g, f, rng = random_world_factory(5)
        v_q, cats = random_query(g, f, rng, 2)
        stats: dict = {}
        naive_skysr(g, f, v_q, cats, engine="pne", stats=stats)
        assert stats["osr_queries"] == len(super_category_sequences(f, cats))

    def test_destination_variant(self, random_world_factory):
        g, f, rng = random_world_factory(6, depth2=True)
        v_q, cats = random_query(g, f, rng, 2)
        dest = int(rng.integers(0, g.n_road))
        want = score_set(brute_force_skysr(g, f, v_q, cats, destination=dest))
        nv = score_set(naive_skysr(g, f, v_q, cats, engine="dijkstra", destination=dest))
        assert nv == want
