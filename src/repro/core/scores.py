"""Route scores (Def. 3.5) under the paper's experimental scoring (Eq. 6/7).

A route ``R = <p_1 ... p_k>`` for query ``(v_q, S_q)`` has

* length score ``l(R) = D(v_q, p_1) + sum_i D(p_i, p_{i+1})`` — network
  shortest-path legs, and
* semantic score ``s(R) = 1 - prod_i sim(c_{p_i}, c_{S_q}[i])`` — one minus
  the product of Wu–Palmer similarities (Eq. 7), so a perfectly matching
  route scores 0 and anything semantically looser scores more.

Partial routes carry the running similarity *product*; the possible minimum
semantic score ``s_(R)`` of a partial route assumes every remaining position
matches perfectly (factor 1), i.e. ``s_(R) = 1 - prod``.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.graphs.categories import CategoryForest
from repro.graphs.dijkstra import dijkstra
from repro.graphs.generator import Graph


def semantic_score(sim_product: float) -> float:
    """Eq. 7: s = 1 - prod of per-position similarities."""
    return 1.0 - sim_product


@dataclass(frozen=True)
class PartialRoute:
    """A (possibly complete) route with its running scores.

    ``pois`` holds the PoI vertices chosen so far; ``length`` the sum of
    shortest-path legs from the start point; ``sim_product`` the product of
    the per-position category similarities.
    """

    pois: tuple[int, ...]
    length: float
    sim_product: float

    @property
    def size(self) -> int:
        return len(self.pois)

    @property
    def end(self) -> int:
        return self.pois[-1]

    @property
    def min_semantic(self) -> float:
        """``s_(R)`` — semantic score if all remaining matches are perfect."""
        return semantic_score(self.sim_product)

    def extend(self, poi: int, leg: float, sim: float) -> "PartialRoute":
        return PartialRoute(self.pois + (poi,), self.length + leg, self.sim_product * sim)


def route_scores(
    graph: Graph,
    forest: CategoryForest,
    v_q: int,
    seq_cats: list[int],
    route: tuple[int, ...],
) -> tuple[float, float]:
    """Recompute ``(l(R), s(R))`` from scratch — the slow, obviously-correct
    path used by tests and the brute-force oracle (never by BSSR itself)."""
    if len(route) != len(seq_cats):
        raise ValueError("route and category sequence sizes differ (Def. 3.4-i)")
    total = 0.0
    prev = v_q
    prod = 1.0
    for poi, cat in zip(route, seq_cats):
        d = dijkstra(graph, prev, targets=[poi])[poi]
        total += float(d)
        prod *= forest.sim(int(graph.cat_of[poi]), cat)
        prev = poi
    return total, semantic_score(prod)


def is_sequenced_route(
    graph: Graph, forest: CategoryForest, seq_cats: list[int], route: tuple[int, ...]
) -> bool:
    """Def. 3.4: right size, per-position semantic match, all PoIs distinct."""
    if len(route) != len(seq_cats):
        return False
    if len(set(route)) != len(route):
        return False
    for poi, cat in zip(route, seq_cats):
        c = int(graph.cat_of[poi])
        if c < 0 or not forest.same_tree(c, cat):
            return False
    return True
