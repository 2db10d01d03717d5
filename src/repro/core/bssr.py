"""BSSR — the bulk SkySR algorithm (§5, Algorithms 1–2) with the four
optimization techniques of §5.3, each independently switchable:

1. ``use_nninit``   — NNinit initial search seeding the upper bound (§5.3.1);
2. ``pq_mode``      — ``"proposed"`` (size-major, then semantic, then length)
                      vs ``"distance"`` priority queue (§5.3.2);
3. ``use_min_dist`` — possible-minimum-distance lower bounds + Lemma 5.8
                      perfect-match pruning (§5.3.3);
4. ``use_cache``    — on-the-fly caching of modified-Dijkstra results
                      (§5.3.4).

"BSSR w/o Opt" in the paper's plots is all four disabled; the
branch-and-bound core (Lemmas 5.1–5.3) and the modified Dijkstra with the
Lemma 5.5 pass-through/stop rules are always part of BSSR itself.

Exactness notes (Theorem 3 is preserved under every flag combination):

* The Lemma 5.5 rules and the cache assume the swap-in PoI is usable, which
  holds when the per-position match sets are pairwise disjoint (implied by
  the paper's distinct-trees workload constraint).  For queries whose match
  sets overlap — repeated trees, or multi-category PoIs straddling trees —
  both are auto-disabled.
* Thresholds (Eq. 3) are monotone in the semantic score, so the Algorithm 2
  line-8 break with the fetched route's threshold is conservative for every
  candidate's own (tighter) threshold check at line 10.

The module is fully instrumented (:class:`BSSRStats`) because Tables 7/8 and
Figures 4/5 of the evaluation report internal counters, not just times.
"""
from __future__ import annotations

import heapq
import time
from dataclasses import dataclass

import numpy as np

from repro.core.bounds import MinDistBounds
from repro.core.dominance import SkylineSet
from repro.core.nninit import nninit, nninit_ratio, _destination_distances
from repro.core.query import QueryContext
from repro.core.scores import PartialRoute
from repro.graphs.categories import CategoryForest
from repro.graphs.generator import Graph

INF = float("inf")


@dataclass
class BSSROptions:
    use_nninit: bool = True
    pq_mode: str = "proposed"  # "proposed" | "distance"
    use_min_dist: bool = True
    use_cache: bool = True
    use_lemma55: bool = True  # core mDijkstra rule, not one of the four opts

    @classmethod
    def none(cls) -> "BSSROptions":
        """The paper's "BSSR w/o Opt": branch-and-bound core only."""
        return cls(use_nninit=False, pq_mode="distance", use_min_dist=False, use_cache=False)


@dataclass
class BSSRStats:
    visited_vertices: int = 0
    mdijkstra_runs: int = 0
    mdijkstra_requests: int = 0  # runs + cache hits
    cache_hits: int = 0
    queue_pushes: int = 0
    first_weight_sum: float = 0.0  # sum of edge weights scanned by the first mDijkstra
    first_radius: float = 0.0  # distance radius settled by the first mDijkstra
    nninit_time_ms: float = 0.0
    nninit_routes: int = 0
    nninit_ratio: float = 1.0
    total_time_ms: float = 0.0
    n_results: int = 0


@dataclass
class _CacheEntry:
    candidates: list[tuple[float, int, float]]  # (dist, poi, sim) sorted by dist
    radius: float  # complete for all candidates with dist < radius


@dataclass
class BSSRResult:
    routes: list[tuple[float, float, tuple[int, ...]]]  # (l, s, pois) skyline
    stats: BSSRStats

    def score_set(self) -> set[tuple[float, float]]:
        return {(round(l, 9), round(s, 9)) for (l, s, _r) in self.routes}


def bssr(
    graph: Graph,
    forest: CategoryForest,
    v_q: int,
    seq_cats: list[int],
    *,
    options: BSSROptions | None = None,
    destination: int | None = None,
) -> BSSRResult:
    """Answer the SkySR query ``(v_q, S_q)`` exactly (Def. 4.2)."""
    return _BSSRRun(graph, forest, v_q, list(seq_cats), options or BSSROptions(), destination).run()


def bssr_first_scan(
    graph: Graph,
    forest: CategoryForest,
    v_q: int,
    seq_cats: list[int],
    *,
    use_nninit: bool = True,
) -> BSSRStats:
    """Run only NNinit (optionally) + the *first* modified Dijkstra.

    Table 7 measures the first search's scanned edge-weight sum with and
    without the initial search; the full run's first scan is identical by
    construction, so this avoids paying for the rest of the search when
    only that metric is needed.
    """
    run = _BSSRRun(graph, forest, v_q, list(seq_cats), BSSROptions(use_nninit=use_nninit), None)
    if use_nninit:
        tn = time.perf_counter()
        run.S = nninit(run.ctx)
        run.stats.nninit_time_ms = (time.perf_counter() - tn) * 1e3
        run.stats.nninit_routes = len(run.S)
        run.stats.nninit_ratio = nninit_ratio(run.S)
        run.bounds = MinDistBounds.compute(run.ctx, run.S.threshold(0.0))
    run._expand(PartialRoute((), 0.0, 1.0))
    return run.stats


class _BSSRRun:
    def __init__(
        self,
        graph: Graph,
        forest: CategoryForest,
        v_q: int,
        seq_cats: list[int],
        options: BSSROptions,
        destination: int | None,
    ) -> None:
        self.ctx = QueryContext(graph, forest, v_q, seq_cats, destination)
        self.opt = options
        self.stats = BSSRStats()
        # Lemma 5.5 / caching are only route-independent when the query's
        # match sets are pairwise disjoint (DESIGN.md §deviations-3).
        self.lemma55 = options.use_lemma55 and self.ctx.trees_distinct
        self.cache_on = options.use_cache and self.ctx.trees_distinct
        self.cache: dict[tuple[int, int], _CacheEntry] = {}
        self.S = SkylineSet()
        self.bounds = MinDistBounds.zeros(self.ctx.k)
        self.dest_dist = _destination_distances(self.ctx)
        self.heap: list[tuple[tuple, int, PartialRoute]] = []
        self._push_seq = 0

    # ------------------------------------------------------------ plumbing
    def _key(self, r: PartialRoute) -> tuple:
        if self.opt.pq_mode == "proposed":
            return (-r.size, r.min_semantic, r.length)
        return (r.length,)

    def _push(self, r: PartialRoute) -> None:
        self._push_seq += 1
        self.stats.queue_pushes += 1
        heapq.heappush(self.heap, (self._key(r), self._push_seq, r))

    def _remaining_ls(self, size: int) -> float:
        return self.bounds.remaining_ls(size) if self.opt.use_min_dist else 0.0

    def _prunable(self, size: int, length: float, prod: float) -> bool:
        """Lemma 5.3 (+ l_s tightening) and Lemma 5.8 pruning for a partial
        or complete candidate state."""
        s_min = 1.0 - prod
        if length + self._remaining_ls(size) >= self.S.threshold(s_min):
            return True
        if self.opt.use_min_dist and size < self.ctx.k:
            # Lemma 5.8: (a) every non-perfect completion is dominated ...
            m = self.ctx.max_nonperfect_suffix(size)
            s_nonperf = 1.0 - prod * m
            if self.S.threshold(s_nonperf) <= length:
                # ... and (b) the forced perfect completion is dominated too.
                if self.S.threshold(s_min) <= length + self.bounds.remaining_lp(size):
                    return True
        return False

    # ------------------------------------------------------------ mDijkstra
    def _scan(self, p_d: int, pos: int, budget: float) -> _CacheEntry:
        """One modified-Dijkstra execution (Algorithm 2), complete for all
        matching PoIs with ``dist < budget`` from ``p_d``."""
        g = self.ctx.graph
        indptr, indices, weights = g.csr()
        sim_arr = self.ctx.sim_arrs[pos]
        first_run = self.stats.mdijkstra_runs == 0
        self.stats.mdijkstra_runs += 1

        dist = np.full(g.n_vertices, INF)
        passed = np.zeros(g.n_vertices)
        settled = np.zeros(g.n_vertices, dtype=bool)
        dist[p_d] = 0.0
        pq: list[tuple[float, int]] = [(0.0, p_d)]
        cands: list[tuple[float, int, float]] = []
        radius = INF
        weight_sum = 0.0
        max_d = 0.0
        while pq:
            d, u = heapq.heappop(pq)
            if settled[u]:
                continue
            if d >= budget:
                radius = d  # complete below d; candidates at >= d not emitted
                break
            settled[u] = True
            self.stats.visited_vertices += 1
            max_d = d
            sim_u = float(sim_arr[u])
            if sim_u > 0.0 and (not self.lemma55 or sim_u > passed[u]):
                cands.append((d, u, sim_u))
            if self.lemma55 and sim_u == 1.0:
                continue  # Lemma 5.5-ii: never worth passing a perfect match
            new_passed = max(passed[u], sim_u) if self.lemma55 else 0.0
            for j in range(indptr[u], indptr[u + 1]):
                v = indices[j]
                w = weights[j]
                if first_run:
                    weight_sum += w
                nd = d + w
                if nd < dist[v]:
                    dist[v] = nd
                    passed[v] = new_passed
                    heapq.heappush(pq, (nd, v))
        if first_run:
            self.stats.first_weight_sum = weight_sum
            self.stats.first_radius = max_d
        return _CacheEntry(cands, radius)

    def _candidates(self, p_d: int, pos: int, budget: float) -> list[tuple[float, int, float]]:
        """Fetch matching PoIs below ``budget``, via the on-the-fly cache
        (§5.3.4) when it already holds a deep-enough scan from ``p_d``."""
        self.stats.mdijkstra_requests += 1
        if not self.cache_on:
            return self._scan(p_d, pos, budget).candidates
        key = (p_d, pos)
        entry = self.cache.get(key)
        if entry is not None and entry.radius >= budget:
            self.stats.cache_hits += 1
        else:
            entry = self._scan(p_d, pos, budget)
            self.cache[key] = entry
        return [c for c in entry.candidates if c[0] < budget]

    # ------------------------------------------------------------ expansion
    def _expand(self, r: PartialRoute) -> None:
        pos = r.size  # next category position to match (0-indexed)
        p_d = r.end if r.size > 0 else self.ctx.v_q
        thresh = self.S.threshold(r.min_semantic)
        budget = thresh - r.length - self._remaining_ls(pos + 1)
        if budget <= 0.0:
            return
        k = self.ctx.k
        route_set = set(r.pois)
        for d, u, sim_u in self._candidates(p_d, pos, budget):
            if u in route_set:
                continue  # Def. 3.4-iii (only reachable when trees repeat)
            new_len = r.length + d
            new_prod = r.sim_product * sim_u
            size_t = pos + 1
            if size_t == k:
                final_len = new_len + (float(self.dest_dist[u]) if self.dest_dist is not None else 0.0)
                self.S.update(final_len, 1.0 - new_prod, r.pois + (u,))
            else:
                if self._prunable(size_t, new_len, new_prod):
                    continue
                self._push(r.extend(u, d, sim_u))

    # ------------------------------------------------------------ main loop
    def run(self) -> BSSRResult:
        t0 = time.perf_counter()
        if self.opt.use_nninit:
            tn = time.perf_counter()
            self.S = nninit(self.ctx)
            self.stats.nninit_time_ms = (time.perf_counter() - tn) * 1e3
            self.stats.nninit_routes = len(self.S)
            self.stats.nninit_ratio = nninit_ratio(self.S)
        if self.opt.use_min_dist:
            self.bounds = MinDistBounds.compute(self.ctx, self.S.threshold(0.0))
        self._expand(PartialRoute((), 0.0, 1.0))
        while self.heap:
            _key, _seq, r = heapq.heappop(self.heap)
            # Thresholds tightened since this route was pushed — recheck.
            if self._prunable(r.size, r.length, r.sim_product):
                continue
            self._expand(r)
        self.stats.total_time_ms = (time.perf_counter() - t0) * 1e3
        self.stats.n_results = len(self.S)
        return BSSRResult(self.S.routes(), self.stats)
