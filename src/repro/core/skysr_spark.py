"""Distributed SkySR — BSSR as an iterative DataFrame join/filter/prune
pipeline (the ``repro`` band's target mapping).

One level per category position, bulk-synchronously:

1. **semantic hierarchy filter** — the PoIs matching position ``i`` are
   derived relationally: Wu–Palmer similarities from the ancestor-closure
   table (`similarity_df`, same SQL the DuckDB oracle runs) joined onto the
   PoI table;
2. **distance join** — multi-source shortest paths from the frontier's
   endpoint PoIs to the next position's matches, via either Spark SSSP
   engine (`repro.graphs.sssp_spark`), with per-source cutoffs derived from
   the branch-and-bound thresholds;
3. **prune** — the Lemma 5.3 threshold rule (tightened by the Def. 5.7
   semantic-match minimum distances) applied as a ``LEFT ANTI`` join against
   the broadcast upper-bound set seeded by a local NNinit run: a partial
   route survives only if *no* already-known sequenced route dominates every
   possible completion of it;
4. after the last level, candidates (plus the NNinit seeds, which the
   threshold prune may have cut as self-equivalent) pass through a window
   skyline to the minimal result set.

Exactness: pruning only ever compares against *complete* sequenced routes
(Lemma 5.3), never partial-vs-partial — under the all-PoIs-distinct rule a
partial-route dominance prune would be unsound (DESIGN.md §deviations-2).
The final skyline therefore returns exactly the Def. 4.2 minimal set, which
tests verify against local BSSR and brute force.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T
from pyspark.sql.window import Window

from repro.core.bounds import MinDistBounds
from repro.core.nninit import nninit, _destination_distances
from repro.core.query import QueryContext
from repro.graphs.categories import WU_PALMER_SQL, CategoryForest
from repro.graphs.generator import Dataset, Graph
from repro.graphs.sssp_spark import bellman_ford_sssp, edges_bidirectional, partitioned_dijkstra

INF = float("inf")
_EPS = 1e-12


# ------------------------------------------------------------- table views
def dataset_tables(spark: SparkSession, ds: Dataset) -> dict[str, DataFrame]:
    """Relational view of a dataset: edges, pois, categories, ancestors."""
    return {
        "edges": spark.createDataFrame(ds.graph.edges_pandas()),
        "pois": spark.createDataFrame(ds.graph.pois_pandas()),
        "categories": spark.createDataFrame(ds.forest.to_pandas()),
        "ancestors": spark.createDataFrame(ds.forest.ancestors_pandas()),
    }


def similarity_df(spark: SparkSession, ancestors: DataFrame, target: int) -> DataFrame:
    """Wu–Palmer similarity of every same-tree category to ``target``,
    computed relationally from the ancestor closure (shared SQL with the
    DuckDB oracle)."""
    ancestors.createOrReplaceTempView("_anc")
    return spark.sql(WU_PALMER_SQL.format(anc="_anc", target=int(target)))


def skyline_df(df: DataFrame, l_col: str = "length", s_col: str = "semantic") -> DataFrame:
    """Minimal skyline: sweep in (l, s) order keeping strict s improvements.

    Single-partition window — candidate sets are small by the time this
    runs (post-pruning), mirroring the paper's observation that |S| stays
    tiny (§7.4).
    """
    w = (
        Window.orderBy(F.col(l_col).asc(), F.col(s_col).asc())
        .rowsBetween(Window.unboundedPreceding, -1)
    )
    swept = (
        df.withColumn("_prev_min_s", F.min(s_col).over(w))
        .where(F.col("_prev_min_s").isNull() | (F.col(s_col) < F.col("_prev_min_s") - _EPS))
        .drop("_prev_min_s")
    )
    # The sweep can keep a row whose length ties a *later*, semantically
    # better row within _EPS (float legs summed in different orders): an
    # eps-dominance anti self-join over the small swept set removes those.
    other = swept.select(F.col(l_col).alias("_ol"), F.col(s_col).alias("_os"))
    dominated = (
        (F.col("_ol") < F.col(l_col) - _EPS) & (F.col("_os") <= F.col(s_col) + _EPS)
    ) | ((F.col("_os") < F.col(s_col) - _EPS) & (F.col("_ol") <= F.col(l_col) + _EPS))
    return swept.join(other, on=dominated, how="left_anti")


# ---------------------------------------------------------------- pipeline
def skysr_spark(
    spark: SparkSession,
    graph: Graph,
    forest: CategoryForest,
    v_q: int,
    seq_cats: list[int],
    *,
    engine: str = "partitioned",  # "partitioned" | "bellman"
    destination: int | None = None,
    use_bounds: bool = True,
) -> DataFrame:
    """Answer the SkySR query as a DataFrame of ``(route, length, semantic)``
    rows (``route`` is an array of PoI vertex ids)."""
    ctx = QueryContext(graph, forest, v_q, seq_cats, destination)
    k = ctx.k

    # --- local seeding: NNinit upper bounds + minimum-distance lower bounds
    S0 = nninit(ctx)
    bounds = MinDistBounds.compute(ctx, S0.threshold(0.0)) if use_bounds else MinDistBounds.zeros(k)
    entries = spark.createDataFrame(
        pd.DataFrame(
            {"ts": [s for (s, l, _r) in S0.entries], "tl": [l for (s, l, _r) in S0.entries]}
        )
        if len(S0)
        else pd.DataFrame({"ts": pd.Series(dtype=float), "tl": pd.Series(dtype=float)})
    )
    dest_dist = _destination_distances(ctx)

    # --- semantic hierarchy filters, one per position, built relationally
    ancestors = spark.createDataFrame(forest.ancestors_pandas())
    pois = spark.createDataFrame(graph.pois_pandas())
    match_dfs: list[DataFrame] = []
    for c in seq_cats:
        sim = similarity_df(spark, ancestors, c)
        match_dfs.append(
            pois.join(sim, on="cat_id")
            .where(F.col("sim") > 0)
            .select(F.col("poi_id").alias("vertex"), "sim")
        )

    edges = edges_bidirectional(spark, graph) if engine == "bellman" else None

    route_schema = T.StructType(
        [
            T.StructField("route", T.ArrayType(T.LongType()), False),
            T.StructField("end", T.LongType(), False),
            T.StructField("length", T.DoubleType(), False),
            T.StructField("prod", T.DoubleType(), False),
        ]
    )
    frontier = spark.createDataFrame(
        [([], int(v_q), 0.0, 1.0)], schema=route_schema
    )

    completed: DataFrame | None = None
    for pos in range(k):
        suffix_next = bounds.remaining_ls(pos + 1)
        # Per-row Eq. 3 threshold: tightest known sequenced-route length at
        # this row's best-possible semantic score.
        fr = frontier.withColumn("s_min", F.lit(1.0) - F.col("prod"))
        th = entries
        fr = (
            fr.join(th, on=[th.ts <= fr.s_min + F.lit(_EPS)], how="left")
            .groupBy("route", "end", "length", "prod", "s_min")
            .agg(F.min("tl").alias("thresh"))
            .withColumn("thresh", F.coalesce(F.col("thresh"), F.lit(INF)))
            .withColumn("budget", F.col("thresh") - F.col("length") - F.lit(suffix_next))
            .where(F.col("budget") > 0)
            .localCheckpoint(eager=True)
        )
        src_budget = {
            int(r["end"]): float(r["mb"])
            for r in fr.groupBy("end").agg(F.max("budget").alias("mb")).collect()
        }
        if not src_budget:
            break
        sources = sorted(src_budget)
        if engine == "bellman":
            global_cut = max(src_budget.values())
            dists = bellman_ford_sssp(spark, edges, sources, cutoff=global_cut)
        else:
            emit = np.zeros(graph.n_vertices, dtype=bool)
            emit[ctx.tree_pois[pos]] = True
            dists = partitioned_dijkstra(
                spark, graph, sources, cutoffs=src_budget, emit_only=emit
            )
        cand = dists.join(match_dfs[pos], on="vertex").select(
            F.col("source"), F.col("vertex").alias("poi"), "dist", "sim"
        )
        expanded = (
            fr.join(cand, fr.end == cand.source)
            .where(~F.array_contains(F.col("route"), F.col("poi")))
            .where(F.col("dist") < F.col("budget"))  # Algorithm 2 line 8 analog
            .select(
                F.concat(F.col("route"), F.array(F.col("poi"))).alias("route"),
                F.col("poi").alias("end"),
                (F.col("length") + F.col("dist")).alias("length"),
                (F.col("prod") * F.col("sim")).alias("prod"),
            )
        )
        if pos < k - 1:
            # Algorithm 2 line 10 analog: re-prune with the candidate's own
            # (tighter) threshold before it joins the next frontier.
            frontier = expanded.join(
                th,
                on=[
                    th.ts <= (F.lit(1.0) - expanded.prod) + F.lit(_EPS),
                    th.tl <= expanded.length + F.lit(suffix_next) + F.lit(_EPS),
                ],
                how="left_anti",
            ).localCheckpoint(eager=True)
            if frontier.isEmpty():
                break
        else:
            completed = expanded

    seed_rows = [
        (list(map(int, r)), float(l), float(s)) for (l, s, r) in S0.routes()
    ]
    out_schema = T.StructType(
        [
            T.StructField("route", T.ArrayType(T.LongType()), False),
            T.StructField("length", T.DoubleType(), False),
            T.StructField("semantic", T.DoubleType(), False),
        ]
    )
    seeds = spark.createDataFrame(seed_rows, schema=out_schema)
    if completed is None:
        cands = seeds
    else:
        if dest_dist is not None:
            dd = spark.createDataFrame(
                pd.DataFrame(
                    {
                        "end": np.arange(graph.n_vertices, dtype=np.int64),
                        "dd": dest_dist,
                    }
                )
            )
            completed = completed.join(dd, on="end").withColumn(
                "length", F.col("length") + F.col("dd")
            )
        cands = completed.select(
            "route", "length", (F.lit(1.0) - F.col("prod")).alias("semantic")
        ).unionByName(seeds)
    return skyline_df(cands)


def skysr_spark_scores(df: DataFrame) -> set[tuple[float, float]]:
    """Collected (length, semantic) score pairs, rounded like BSSRResult."""
    return {
        (round(r["length"], 9), round(r["semantic"], 9)) for r in df.collect()
    }
