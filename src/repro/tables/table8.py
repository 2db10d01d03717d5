"""Table 8 — effect of the priority queue arrangement (§5.3.2).

Total vertices visited (priority-queue pops across every modified-Dijkstra
execution) summed over the query batch, for the proposed size-major queue
vs the conventional distance-based queue.  The paper's shape: proposed is
always lower, and the gap widens as |S_q| grows because the distance-based
queue keeps extending short prefixes and rarely tightens the upper bound.
"""
from __future__ import annotations

from repro.core.bssr import BSSROptions, bssr
from repro.tables.common import DATASETS, env_queries, env_scale, get_dataset
from repro.workloads import make_queries

PAPER = {
    "tokyo-lite": {
        "proposed": {2: 3750, 3: 17600, 4: 112000, 5: 397000},
        "distance": {2: 3890, 3: 23500, 4: 189000, 5: 1760000},
    },
    "nyc-lite": {
        "proposed": {2: 13800, 3: 108000, 4: 172000, 5: 637000},
        "distance": {2: 14800, 3: 165000, 4: 444000, 5: 1520000},
    },
    "cal-lite": {
        "proposed": {2: 4900, 3: 24800, 4: 84900, 5: 383000},
        "distance": {2: 5300, 3: 34900, 4: 168000, 5: 899000},
    },
}

SIZES = (2, 3, 4, 5)


def rows(*, scale: float | None = None, n_queries: int | None = None, sizes=SIZES) -> list[dict]:
    scale = env_scale(1.0) if scale is None else scale
    n_queries = env_queries(5) if n_queries is None else n_queries
    out = []
    for name in DATASETS:
        ds = get_dataset(name, scale)
        for size in sizes:
            queries = make_queries(ds, size=size, n_queries=n_queries, seed=41)
            visited = {"proposed": 0, "distance": 0}
            for q in queries:
                for mode in visited:
                    r = bssr(
                        ds.graph,
                        ds.forest,
                        q.v_q,
                        list(q.seq_cats),
                        options=BSSROptions(pq_mode=mode),
                    )
                    visited[mode] += r.stats.visited_vertices
            p = PAPER[name]
            out.append(
                {
                    "Dataset": name,
                    "|Sq|": size,
                    "proposed": visited["proposed"],
                    "paper proposed": p["proposed"][size],
                    "distance-based": visited["distance"],
                    "paper distance": p["distance"][size],
                    "gap x": round(visited["distance"] / max(visited["proposed"], 1), 2),
                }
            )
    return out


COLUMNS = [
    "Dataset", "|Sq|", "proposed", "paper proposed",
    "distance-based", "paper distance", "gap x",
]
