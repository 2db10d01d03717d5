"""Query workloads matching §7.1: random start vertices; category sequences
drawn from *popular leaf* categories under the constraint that every
position uses a different category tree.  The paper generates 100 queries
per (dataset, |S_q|); jobs/benchmarks scale that count down via a knob.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.graphs.generator import Dataset, popular_leaf_categories


@dataclass(frozen=True)
class Query:
    v_q: int
    seq_cats: tuple[int, ...]


def make_queries(
    ds: Dataset,
    *,
    size: int,
    n_queries: int,
    seed: int = 11,
    min_pois: int = 3,
) -> list[Query]:
    """``n_queries`` SkySR queries of sequence size ``size`` on ``ds``."""
    g = np.random.default_rng(seed + size * 1000)
    by_tree = popular_leaf_categories(ds.graph, ds.forest, min_pois=min_pois)
    trees = [t for t, cats in by_tree.items() if cats]
    if len(trees) < size:
        raise ValueError(
            f"dataset {ds.name} has only {len(trees)} trees with popular leaves; "
            f"cannot build size-{size} distinct-tree sequences"
        )
    out = []
    for _ in range(n_queries):
        v_q = int(g.integers(0, ds.graph.n_road))
        chosen_trees = g.choice(trees, size=size, replace=False)
        cats = tuple(int(g.choice(by_tree[int(t)])) for t in chosen_trees)
        out.append(Query(v_q=v_q, seq_cats=cats))
    return out
