"""NNinit — the initial search of §5.3.1 (Algorithm 3).

Greedily chains nearest *perfect* matches: one Dijkstra per position, each
restarted from the PoI just found.  During the final position's search every
semantically matching PoI settled before the perfect one also completes a
sequenced route, so NNinit returns several routes — one with semantic score
0 (the branch-and-bound seed for ``l̄(φ)``) plus shorter, semantically looser
ones — at the cost of ``|S_q|`` plain Dijkstra runs.

If some position has no reachable perfect match the search aborts and
returns whatever it found; BSSR stays exact (thresholds just start at inf).
"""
from __future__ import annotations

import heapq

import numpy as np

from repro.core.dominance import SkylineSet
from repro.core.query import QueryContext
from repro.core.scores import semantic_score
from repro.graphs.dijkstra import dijkstra

INF = float("inf")


def nninit(ctx: QueryContext) -> SkylineSet:
    """Run Algorithm 3; returns the seeded minimal set ``S``."""
    g = ctx.graph
    indptr, indices, weights = g.csr()
    S = SkylineSet()
    route: tuple[int, ...] = ()
    total_len = 0.0
    start = ctx.v_q
    dest_extra = _destination_distances(ctx)

    for i in range(ctx.k):
        sim_arr = ctx.sim_arrs[i]
        last = i == ctx.k - 1
        dist = np.full(g.n_vertices, INF)
        dist[start] = 0.0
        settled = np.zeros(g.n_vertices, dtype=bool)
        pq: list[tuple[float, int]] = [(0.0, start)]
        found_perfect = False
        while pq:
            d, u = heapq.heappop(pq)
            if settled[u]:
                continue
            settled[u] = True
            sim_u = sim_arr[u]
            usable = sim_u > 0.0 and u not in route
            if last and usable:
                # Every semantic match settled on the way in completes a
                # sequenced route (Algorithm 3 lines 9–11).
                l = total_len + d + (dest_extra[u] if dest_extra is not None else 0.0)
                S.update(l, semantic_score(sim_u), route + (u,))
            if usable and sim_u == 1.0:
                route = route + (u,)
                total_len += d
                start = u
                found_perfect = True
                break
            for j in range(indptr[u], indptr[u + 1]):
                v = indices[j]
                nd = d + weights[j]
                if nd < dist[v]:
                    dist[v] = nd
                    heapq.heappush(pq, (nd, v))
        if not found_perfect:
            break  # no perfect match reachable — return what we have
    return S


def nninit_ratio(S: SkylineSet) -> float:
    """Table 7's "Ratio": length of the NNinit route with the *largest*
    semantic score over the length of its semantic-score-0 route."""
    rows = S.routes()
    if len(rows) < 2:
        return 1.0
    perfect = [l for (l, s, _r) in rows if s <= 1e-12]
    if not perfect:
        return 1.0
    loosest = max(rows, key=lambda r: r[1])
    return loosest[0] / perfect[0] if perfect[0] > 0 else 1.0


def _destination_distances(ctx: QueryContext) -> np.ndarray | None:
    """Distances from every vertex *to* the destination (§6 variant).

    One reverse Dijkstra from the destination: on undirected graphs this is
    the plain search; on directed ones it walks in-edges.
    """
    if ctx.destination is None:
        return None
    return dijkstra(ctx.graph, ctx.destination, reverse=True)
