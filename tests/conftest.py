"""Shared fixtures for the test suite.

The Spark session fixture lives in the repo-root conftest; here we add
small deterministic datasets and graph factories so individual tests stay
fast and reproducible.
"""
from __future__ import annotations

import numpy as np
import pytest

from repro.graphs.categories import depth2_forest, foursquare_lite_forest
from repro.graphs.generator import dataset, road_network


@pytest.fixture(scope="session")
def tiny_tokyo():
    """~290-vertex tokyo-lite slice — brute-forceable, still road-shaped."""
    return dataset("tokyo-lite", scale=0.04, seed=3)


@pytest.fixture(scope="session")
def tiny_cal():
    """Clustered-PoI preset slice (trees generated, height 3)."""
    return dataset("cal-lite", scale=0.02, seed=5)


@pytest.fixture(scope="session")
def depth2_world():
    """Small graph over a depth-2 forest, where the naive baseline is
    provably exact (DESIGN.md §deviations-4)."""
    forest = depth2_forest(6, 5)
    graph = road_network(n_road=150, n_edges_road=190, n_pois=80, forest=forest, seed=9)
    return graph, forest


@pytest.fixture(scope="session")
def random_world_factory():
    """Factory for randomized small worlds: (graph, forest, rng)."""

    def make(seed: int, *, n_road: int = 120, n_pois: int = 70, depth2: bool = False):
        forest = depth2_forest(6, 5) if depth2 else foursquare_lite_forest()
        g = road_network(
            n_road=n_road,
            n_edges_road=int(n_road * 1.3),
            n_pois=n_pois,
            forest=forest,
            seed=seed,
        )
        return g, forest, np.random.default_rng(seed)

    return make


def random_query(graph, forest, rng, size: int, *, distinct_trees: bool = True):
    """A random query over popular categories (test-local helper)."""
    from repro.graphs.generator import popular_leaf_categories

    by_tree = popular_leaf_categories(graph, forest, min_pois=2)
    trees = [t for t in by_tree if by_tree[t]]
    if len(trees) < size:
        pytest.skip("not enough populated trees for this size")
    if distinct_trees:
        ts = rng.choice(trees, size=size, replace=False)
        cats = [int(rng.choice(by_tree[int(t)])) for t in ts]
    else:
        ts = rng.choice(trees, size=size, replace=True)
        cats = [int(rng.choice(by_tree[int(t)])) for t in ts]
    v_q = int(rng.integers(0, graph.n_road))
    return v_q, cats
