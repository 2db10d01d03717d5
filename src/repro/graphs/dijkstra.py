"""Local shortest-path primitives over :class:`repro.graphs.generator.Graph`.

Three variants back the paper's machinery:

* :func:`dijkstra` — single-source distances with optional cutoff / early
  target termination (the workhorse inside OSR baselines and scoring);
* :func:`multi_source_to_targets` — the multi-source multi-destination
  Dijkstra of §5.3.3 (Lemma 5.9): all sources enter one priority queue at
  distance 0 and the first settled destination yields the minimum
  source-set-to-target-set distance;
* :func:`knn_pois` — a progressive nearest-neighbour generator over a PoI
  set, the primitive PNE [16] expands routes with.

The distributed counterparts live in ``repro.graphs.sssp_spark``.
"""
from __future__ import annotations

import heapq
from collections.abc import Iterable, Iterator

import numpy as np

from repro.graphs.generator import Graph

INF = float("inf")


def dijkstra(
    graph: Graph,
    source: int,
    *,
    cutoff: float = INF,
    targets: Iterable[int] | None = None,
    reverse: bool = False,
) -> np.ndarray:
    """Distances from ``source``; vertices beyond ``cutoff`` stay ``inf``.

    If ``targets`` is given, the search stops once every target is settled
    (distances to other vertices are then only valid below the last settled
    target's distance).  ``reverse`` walks in-edges instead — distances *to*
    ``source`` on a directed graph (no-op on undirected ones).
    """
    indptr, indices, weights = graph.csr_reverse() if reverse else graph.csr()
    dist = np.full(graph.n_vertices, INF)
    dist[source] = 0.0
    remaining = set(int(t) for t in targets) if targets is not None else None
    pq: list[tuple[float, int]] = [(0.0, source)]
    settled = np.zeros(graph.n_vertices, dtype=bool)
    while pq:
        d, u = heapq.heappop(pq)
        if settled[u]:
            continue
        settled[u] = True
        if remaining is not None:
            remaining.discard(u)
            if not remaining:
                break
        for i in range(indptr[u], indptr[u + 1]):
            v = indices[i]
            nd = d + weights[i]
            if nd < dist[v] and nd <= cutoff:
                dist[v] = nd
                heapq.heappush(pq, (nd, v))
    return dist


def pairwise_distances(graph: Graph, sources: Iterable[int]) -> dict[int, np.ndarray]:
    """Full distance rows for each source (used by tiny-graph oracles)."""
    return {int(s): dijkstra(graph, int(s)) for s in sources}


def multi_source_to_targets(
    graph: Graph,
    sources: Iterable[int],
    targets: Iterable[int],
) -> float:
    """Minimum distance from any source to any target (Lemma 5.9).

    All sources are seeded at distance 0 in one queue; by the standard
    Dijkstra invariant the first settled target is at the global minimum
    source-to-target distance.  Returns ``inf`` when unreachable or either
    set is empty.
    """
    src = [int(s) for s in sources]
    tgt = set(int(t) for t in targets)
    if not src or not tgt:
        return INF
    indptr, indices, weights = graph.csr()
    dist = np.full(graph.n_vertices, INF)
    pq: list[tuple[float, int]] = []
    for s in src:
        dist[s] = 0.0
        heapq.heappush(pq, (0.0, s))
    settled = np.zeros(graph.n_vertices, dtype=bool)
    while pq:
        d, u = heapq.heappop(pq)
        if settled[u]:
            continue
        settled[u] = True
        if u in tgt:
            return d
        for i in range(indptr[u], indptr[u + 1]):
            v = indices[i]
            nd = d + weights[i]
            if nd < dist[v]:
                dist[v] = nd
                heapq.heappush(pq, (nd, v))
    return INF


def knn_pois(
    graph: Graph,
    source: int,
    poi_set: Iterable[int],
    *,
    exclude: Iterable[int] = (),
) -> Iterator[tuple[int, float]]:
    """Yield ``(poi, dist)`` from ``source`` in nondecreasing distance.

    Lazily advances a Dijkstra frontier; used by PNE to fetch the next
    nearest matching PoI on demand without bounding k up front.
    """
    members = set(int(p) for p in poi_set) - set(int(e) for e in exclude)
    indptr, indices, weights = graph.csr()
    dist = np.full(graph.n_vertices, INF)
    dist[source] = 0.0
    pq: list[tuple[float, int]] = [(0.0, source)]
    settled = np.zeros(graph.n_vertices, dtype=bool)
    while pq:
        d, u = heapq.heappop(pq)
        if settled[u]:
            continue
        settled[u] = True
        if u in members:
            yield u, d
        for i in range(indptr[u], indptr[u + 1]):
            v = indices[i]
            nd = d + weights[i]
            if nd < dist[v]:
                dist[v] = nd
                heapq.heappush(pq, (nd, v))


def floyd_warshall_reference(graph: Graph) -> np.ndarray:
    """O(V^3) all-pairs reference — an independent implementation used only
    by tests to validate the Dijkstra variants on tiny graphs."""
    n = graph.n_vertices
    d = np.full((n, n), INF)
    np.fill_diagonal(d, 0.0)
    for u, v, w in zip(graph.edges_u, graph.edges_v, graph.edges_w):
        d[u, v] = min(d[u, v], w)
        if not graph.directed:
            d[v, u] = min(d[v, u], w)
    for k in range(n):
        d = np.minimum(d, d[:, k : k + 1] + d[k : k + 1, :])
    return d
