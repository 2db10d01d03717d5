"""Table 9 / §7.5 usecase — example SkySRs in Tokyo with a destination.

The paper's user plans Beer Garden -> Sushi Restaurant -> Sake Bar and then
a hotel: two categories from the *same* tree (both under "Bar"), which
exercises BSSR's general path (Lemma 5.5 / caching auto-disabled), plus the
§6 destination extension.  We mirror the structure on ``tokyo-lite``: two
distinct leaves under "Bar" (Nightlife tree) around one leaf under
"Asian Restaurant" (Food tree), destination at a road vertex, and report
every returned SkySR with distances and category names.  The paper's
headline is qualitative: a handful of SkySRs, where a semantically looser
route is much shorter than the perfect match — asserted by the test suite.
"""
from __future__ import annotations

from repro.core.bssr import bssr
from repro.tables.common import env_scale, get_dataset

PAPER_EXAMPLE = [
    (7451, "Beer Garden -> Sushi Restaurant -> Sake Bar"),
    (1295, "Bar -> Sushi Restaurant -> Sake Bar"),
]


def pick_usecase_query(ds):
    """Two popular leaves under the Nightlife "Bar" mid-category plus one
    under Food "Asian Restaurant", in paper order (bar, food, bar)."""
    forest = ds.forest
    mids = {name: i for i, name in enumerate(forest.name)}
    bar_leaves = [c for c in forest.leaves() if forest.name[forest.parent[c]] == "Bar"]
    asian_leaves = [c for c in forest.leaves() if forest.name[forest.parent[c]] == "Asian Restaurant"]
    counts = lambda c: len(ds.graph.pois_of_category(c))  # noqa: E731
    bar_leaves = sorted(bar_leaves, key=counts, reverse=True)
    asian_leaves = sorted(asian_leaves, key=counts, reverse=True)
    if len(bar_leaves) < 2 or not asian_leaves:
        raise RuntimeError("usecase categories missing from forest")
    return [bar_leaves[0], asian_leaves[0], bar_leaves[1]]


def rows(*, scale: float | None = None) -> list[dict]:
    scale = env_scale(1.0) if scale is None else scale
    ds = get_dataset("tokyo-lite", scale)
    seq = pick_usecase_query(ds)
    v_q = ds.graph.n_road // 2
    destination = ds.graph.n_road // 3
    res = bssr(ds.graph, ds.forest, v_q, seq, destination=destination)
    out = []
    for l, s, route in sorted(res.routes, key=lambda r: r[1]):
        cats = " -> ".join(ds.forest.name[int(ds.graph.cat_of[p])] for p in route)
        out.append(
            {
                "Distance": round(l, 4),
                "Semantic": round(s, 3),
                "Sequenced route": cats,
            }
        )
    return out


COLUMNS = ["Distance", "Semantic", "Sequenced route"]
