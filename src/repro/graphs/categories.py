"""Category forests (semantic hierarchies) and Wu–Palmer similarity.

The paper attaches every PoI to a single category drawn from a *forest* of
category trees (Foursquare's 10 top-level trees for Tokyo/NYC; a generated
height-3 / fanout-3 forest for the Cal dataset).  Similarity between two
categories (Eq. 6) is Wu–Palmer over the forest:

    sim(c, c') = 2 * d(lca(c, c')) / (d(c) + d(c'))      same tree
    sim(c, c') = 0                                       different trees
    sim(c, c)  = 1

Depth ``d`` counts the root as depth 1, so two distinct children of a root
get ``sim = 2*1/(2+2) = 0.5``.  (Eq. 6 writes a max over ancestors of ``c'``
of the deepest common ancestor of ``c`` and that ancestor; since the common
ancestors of ``c`` and any ancestor of ``c'`` are a subset of those of
``c`` and ``c'``, the max is attained at ``c'`` itself and the expression
reduces to the LCA form implemented here.)
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd


@dataclass
class CategoryForest:
    """A forest of rooted category trees.

    Attributes
    ----------
    parent:
        ``parent[c]`` is the parent category id of ``c`` or ``-1`` for roots.
    tree_id:
        ``tree_id[c]`` is the id of the tree containing ``c``.
    depth:
        ``depth[c]`` with roots at depth 1 (Wu–Palmer convention used here).
    name:
        Human-readable category names (used by the Table 9 usecase job).
    """

    parent: list[int]
    tree_id: list[int]
    depth: list[int]
    name: list[str]
    _anc_cache: dict[int, tuple[int, ...]] = field(default_factory=dict, repr=False)

    # ---------------------------------------------------------------- basics
    @property
    def n_categories(self) -> int:
        return len(self.parent)

    def ancestors(self, c: int) -> tuple[int, ...]:
        """Ancestors of ``c`` from ``c`` itself up to its root (inclusive)."""
        hit = self._anc_cache.get(c)
        if hit is not None:
            return hit
        chain = []
        x = c
        while x != -1:
            chain.append(x)
            x = self.parent[x]
        out = tuple(chain)
        self._anc_cache[c] = out
        return out

    def children(self, c: int) -> list[int]:
        return [i for i, p in enumerate(self.parent) if p == c]

    def leaves(self) -> list[int]:
        has_child = [False] * self.n_categories
        for p in self.parent:
            if p != -1:
                has_child[p] = True
        return [c for c in range(self.n_categories) if not has_child[c]]

    def leaves_of_tree(self, t: int) -> list[int]:
        return [c for c in self.leaves() if self.tree_id[c] == t]

    @property
    def n_trees(self) -> int:
        return len({t for t in self.tree_id})

    # ---------------------------------------------------------- similarity
    def lca(self, c1: int, c2: int) -> int:
        """Deepest common ancestor of two categories, or -1 across trees."""
        if self.tree_id[c1] != self.tree_id[c2]:
            return -1
        a2 = set(self.ancestors(c2))
        for a in self.ancestors(c1):  # walks upward, so first hit is deepest
            if a in a2:
                return a
        return -1

    def sim(self, c1: int, c2: int) -> float:
        """Wu–Palmer similarity (Eq. 6): 0 across trees, 1 on equality."""
        if c1 == c2:
            return 1.0
        m = self.lca(c1, c2)
        if m == -1:
            return 0.0
        return 2.0 * self.depth[m] / (self.depth[c1] + self.depth[c2])

    def same_tree(self, c1: int, c2: int) -> bool:
        return self.tree_id[c1] == self.tree_id[c2]

    def max_nonperfect_sim(self, c: int) -> float:
        """Largest ``sim(c', c) < 1`` over the tree of ``c``.

        This is the paper's footnote-2 quantity behind the minimum semantic
        increment delta of Lemma 5.8: if a route cannot match position ``i``
        perfectly, the factor it contributes is at most this value.
        """
        best = 0.0
        for c2 in range(self.n_categories):
            if c2 != c and self.tree_id[c2] == self.tree_id[c]:
                s = self.sim(c, c2)
                if s < 1.0 and s > best:
                    best = s
        return best

    # ------------------------------------------------------------- tabular
    def to_pandas(self) -> pd.DataFrame:
        """Relational view ``(cat_id, parent_id, tree_id, depth, name)``."""
        return pd.DataFrame(
            {
                "cat_id": np.arange(self.n_categories, dtype=np.int64),
                "parent_id": np.asarray(self.parent, dtype=np.int64),
                "tree_id": np.asarray(self.tree_id, dtype=np.int64),
                "depth": np.asarray(self.depth, dtype=np.int64),
                "name": self.name,
            }
        )

    def ancestors_pandas(self) -> pd.DataFrame:
        """Ancestor closure ``(cat_id, anc_id, anc_depth)`` incl. self rows.

        This is the relational backbone for computing Wu–Palmer similarity in
        Spark SQL / DuckDB: join the closures of two categories on ``anc_id``
        and take the deepest shared row.
        """
        rows = []
        for c in range(self.n_categories):
            for a in self.ancestors(c):
                rows.append((c, a, self.depth[a]))
        return pd.DataFrame(rows, columns=["cat_id", "anc_id", "anc_depth"]).astype(
            {"cat_id": np.int64, "anc_id": np.int64, "anc_depth": np.int64}
        )

    def sim_pandas(self, target: int) -> pd.DataFrame:
        """``(cat_id, sim)`` for every category in the tree of ``target``."""
        rows = [
            (c, self.sim(c, target))
            for c in range(self.n_categories)
            if self.tree_id[c] == self.tree_id[target]
        ]
        return pd.DataFrame(rows, columns=["cat_id", "sim"]).astype(
            {"cat_id": np.int64, "sim": np.float64}
        )


# ------------------------------------------------------------ constructors
def build_forest(tree_specs: list[tuple[str, list[tuple[str, int]]]]) -> CategoryForest:
    """Build a forest from ``[(root_name, [(mid_name, n_leaves), ...]), ...]``.

    Every tree is root -> mids -> leaves (depth 3).  A tree with an empty mid
    list is a single root (depth-1 tree).
    """
    parent: list[int] = []
    tree_id: list[int] = []
    depth: list[int] = []
    name: list[str] = []
    for t, (root_name, mids) in enumerate(tree_specs):
        root = len(parent)
        parent.append(-1)
        tree_id.append(t)
        depth.append(1)
        name.append(root_name)
        for mid_name, n_leaves in mids:
            mid = len(parent)
            parent.append(root)
            tree_id.append(t)
            depth.append(2)
            name.append(mid_name)
            for j in range(n_leaves):
                parent.append(mid)
                tree_id.append(t)
                depth.append(3)
                name.append(f"{mid_name} / leaf {j}")
    return CategoryForest(parent, tree_id, depth, name)


_FOURSQUARE_LITE_SPECS: list[tuple[str, list[tuple[str, int]]]] = [
    ("Food", [("Asian Restaurant", 6), ("European Restaurant", 6), ("Dessert Shop", 6), ("Cafe", 6)]),
    ("Shop & Service", [("Gift Shop", 6), ("Clothing Store", 6), ("Food & Drink Shop", 6), ("Hobby Shop", 6)]),
    ("Arts & Entertainment", [("Museum", 6), ("Music Venue", 6), ("Theater", 6), ("Stadium", 6)]),
    ("Nightlife Spot", [("Bar", 6), ("Brewery", 6), ("Lounge", 6), ("Nightclub", 6)]),
    ("Outdoors & Recreation", [("Park", 6), ("Athletics & Sports", 6), ("Harbor", 6), ("Trail", 6)]),
    ("College & University", [("Academic Building", 6), ("Student Center", 6), ("Lab", 6), ("Library", 6)]),
    ("Event", [("Festival", 6), ("Market", 6), ("Parade", 6), ("Conference", 6)]),
    ("Professional & Other", [("Office", 6), ("Medical Center", 6), ("Factory", 6), ("Government", 6)]),
    ("Residence", [("Home", 6), ("Apartment", 6), ("Dorm", 6), ("Housing Dev", 6)]),
    ("Travel & Transport", [("Airport", 6), ("Train Station", 6), ("Hotel", 6), ("Pier", 6)]),
]


def foursquare_lite_forest() -> CategoryForest:
    """10 depth-3 trees mirroring Foursquare's 10 top-level categories.

    Used by the ``tokyo-lite`` and ``nyc-lite`` presets (the paper attaches
    Foursquare's 10 category trees to those maps).
    """
    return build_forest(_FOURSQUARE_LITE_SPECS)


def generated_forest(n_trees: int, fanout: int = 3, height: int = 3) -> CategoryForest:
    """Uniform generated forest, used by ``cal-lite``.

    The paper's Cal PoIs carry no hierarchy, so the authors "generate a
    category of height three where a non-leaf node has three child nodes"
    (footnote 5); 49 such trees give 637 categories ~= the dataset's 635.
    """
    parent: list[int] = []
    tree_id: list[int] = []
    depth: list[int] = []
    name: list[str] = []

    def add(t: int, p: int, d: int, label: str) -> int:
        idx = len(parent)
        parent.append(p)
        tree_id.append(t)
        depth.append(d)
        name.append(label)
        return idx

    for t in range(n_trees):
        frontier = [add(t, -1, 1, f"T{t}")]
        for d in range(2, height + 1):
            nxt = []
            for f in frontier:
                for j in range(fanout):
                    nxt.append(add(t, f, d, f"{name[f]}.{j}"))
            frontier = nxt
    return CategoryForest(parent, tree_id, depth, name)


def depth2_forest(n_trees: int, n_leaves: int) -> CategoryForest:
    """Root + leaves forest (depth 2).

    Under depth-2 trees the paper's naive super-category-sequence baseline is
    provably exact (see DESIGN.md §deviations-4), so tests compare the
    baselines against BSSR on these forests.
    """
    parent: list[int] = []
    tree_id: list[int] = []
    depth: list[int] = []
    name: list[str] = []
    for t in range(n_trees):
        root = len(parent)
        parent.append(-1)
        tree_id.append(t)
        depth.append(1)
        name.append(f"R{t}")
        for j in range(n_leaves):
            parent.append(root)
            tree_id.append(t)
            depth.append(2)
            name.append(f"R{t}/leaf{j}")
    return CategoryForest(parent, tree_id, depth, name)


# SQL template used by both DuckDB (oracle) and Spark SQL to derive the
# Wu–Palmer similarity of every category against a target category from the
# ancestor-closure table — keeping the relational form in one place so tests
# exercise the same text on both engines.
WU_PALMER_SQL = """
WITH tgt AS (
  SELECT anc_id, anc_depth FROM {anc} WHERE cat_id = {target}
),
tgt_depth AS (
  SELECT MAX(anc_depth) AS d FROM tgt
),
pairs AS (
  SELECT a.cat_id,
         MAX(a.anc_depth) AS lca_depth,
         MAX(a2.self_depth) AS cat_depth
  FROM {anc} a
  JOIN tgt ON a.anc_id = tgt.anc_id
  JOIN (
    SELECT cat_id, MAX(anc_depth) AS self_depth FROM {anc} GROUP BY cat_id
  ) a2 ON a2.cat_id = a.cat_id
  GROUP BY a.cat_id
)
SELECT pairs.cat_id AS cat_id,
       CAST(CASE WHEN pairs.cat_id = {target} THEN 1.0
                 ELSE 2.0 * pairs.lca_depth / (pairs.cat_depth + tgt_depth.d)
            END AS DOUBLE) AS sim
FROM pairs, tgt_depth
"""
