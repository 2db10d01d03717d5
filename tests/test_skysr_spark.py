"""The distributed SkySR pipeline vs local BSSR (and brute force)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.brute import brute_force_skysr, score_set
from repro.core.bssr import bssr
from repro.core.skysr_spark import (
    dataset_tables,
    similarity_df,
    skysr_spark,
    skysr_spark_scores,
)
from repro.core.scores import is_sequenced_route, route_scores
from tests.conftest import random_query


class TestPipelineExactness:
    @pytest.mark.parametrize("seed", [0, 1])
    @pytest.mark.parametrize("size", [2, 3])
    def test_matches_local_bssr(self, spark, tiny_tokyo, seed, size):
        ds = tiny_tokyo
        rng = np.random.default_rng(seed)
        v_q, cats = random_query(ds.graph, ds.forest, rng, size)
        want = bssr(ds.graph, ds.forest, v_q, cats).score_set()
        df = skysr_spark(spark, ds.graph, ds.forest, v_q, cats)
        assert skysr_spark_scores(df) == want

    def test_matches_brute_force(self, spark, tiny_tokyo):
        ds = tiny_tokyo
        rng = np.random.default_rng(5)
        v_q, cats = random_query(ds.graph, ds.forest, rng, 2)
        want = score_set(brute_force_skysr(ds.graph, ds.forest, v_q, cats))
        df = skysr_spark(spark, ds.graph, ds.forest, v_q, cats)
        assert skysr_spark_scores(df) == want

    def test_bellman_engine(self, spark, random_world_factory):
        g, f, rng = random_world_factory(4, n_road=50, n_pois=30)
        v_q, cats = random_query(g, f, rng, 2)
        want = bssr(g, f, v_q, cats).score_set()
        df = skysr_spark(spark, g, f, v_q, cats, engine="bellman")
        assert skysr_spark_scores(df) == want

    def test_without_bounds_still_exact(self, spark, tiny_tokyo):
        ds = tiny_tokyo
        rng = np.random.default_rng(6)
        v_q, cats = random_query(ds.graph, ds.forest, rng, 2)
        want = bssr(ds.graph, ds.forest, v_q, cats).score_set()
        df = skysr_spark(spark, ds.graph, ds.forest, v_q, cats, use_bounds=False)
        assert skysr_spark_scores(df) == want

    def test_destination_variant(self, spark, tiny_tokyo):
        ds = tiny_tokyo
        rng = np.random.default_rng(7)
        v_q, cats = random_query(ds.graph, ds.forest, rng, 2)
        dest = int(rng.integers(0, ds.graph.n_road))
        want = bssr(ds.graph, ds.forest, v_q, cats, destination=dest).score_set()
        df = skysr_spark(spark, ds.graph, ds.forest, v_q, cats, destination=dest)
        assert skysr_spark_scores(df) == want

    def test_routes_are_valid(self, spark, tiny_tokyo):
        ds = tiny_tokyo
        rng = np.random.default_rng(8)
        v_q, cats = random_query(ds.graph, ds.forest, rng, 2)
        rows = skysr_spark(spark, ds.graph, ds.forest, v_q, cats).collect()
        assert rows
        for r in rows:
            route = tuple(int(p) for p in r["route"])
            assert is_sequenced_route(ds.graph, ds.forest, cats, route)
            l2, s2 = route_scores(ds.graph, ds.forest, v_q, cats, route)
            assert r["length"] == pytest.approx(l2)
            assert r["semantic"] == pytest.approx(s2)


class TestRelationalPieces:
    def test_dataset_tables_counts(self, spark, tiny_tokyo):
        t = dataset_tables(spark, tiny_tokyo)
        assert t["edges"].count() == tiny_tokyo.graph.n_edges
        assert t["pois"].count() == tiny_tokyo.graph.n_pois
        assert t["categories"].count() == tiny_tokyo.forest.n_categories

    def test_similarity_df_matches_python_and_duckdb(self, spark, tiny_tokyo):
        """Spark SQL Wu–Palmer == DuckDB Wu–Palmer == direct Python, via the
        repo oracle (same SQL text on both engines)."""
        from repro.graphs.categories import WU_PALMER_SQL
        from repro.oracle import assert_equivalent

        forest = tiny_tokyo.forest
        anc = forest.ancestors_pandas()
        target = forest.leaves_of_tree(3)[2]
        sdf = similarity_df(spark, spark.createDataFrame(anc), target)
        assert_equivalent(sdf, WU_PALMER_SQL.format(anc="anc", target=target), anc=anc)
        got = {int(r["cat_id"]): float(r["sim"]) for r in sdf.collect()}
        for c, s in got.items():
            assert s == pytest.approx(forest.sim(c, target))

    def test_full_query_against_duckdb_oracle(self, spark, random_world_factory):
        """End-to-end oracle: the pipeline's minimal score set equals a
        DuckDB SQL formulation (k-way join over a pairwise-distance table,
        NOT EXISTS skyline) on a small world."""
        from pyspark.sql import functions as F

        from repro.core.query import QueryContext
        from repro.graphs.dijkstra import dijkstra
        from repro.oracle import assert_equivalent
        import pandas as pd

        g, f, rng = random_world_factory(12, n_road=60, n_pois=35)
        v_q, cats = random_query(g, f, rng, 2)
        ctx = QueryContext(g, f, v_q, cats)

        dist_rows = []
        for s in {v_q} | {int(p) for p in ctx.tree_pois[0]}:
            d = dijkstra(g, s)
            for t in ctx.tree_pois[0].tolist() + ctx.tree_pois[1].tolist():
                if np.isfinite(d[t]):
                    dist_rows.append((s, int(t), float(d[t])))
        dists = pd.DataFrame(dist_rows, columns=["src", "dst", "d"]).drop_duplicates()
        m1 = pd.DataFrame(
            {"poi": ctx.tree_pois[0], "sim": [ctx.sim_at(0, p) for p in ctx.tree_pois[0]]}
        )
        m2 = pd.DataFrame(
            {"poi": ctx.tree_pois[1], "sim": [ctx.sim_at(1, p) for p in ctx.tree_pois[1]]}
        )

        sdf = (
            skysr_spark(spark, g, f, v_q, cats)
            .select(
                F.round("length", 6).alias("length"), F.round("semantic", 6).alias("semantic")
            )
            .distinct()
        )
        assert_equivalent(
            sdf,
            f"""
            WITH cand AS (
              SELECT d0.d + d1.d AS length,
                     1 - m1.sim * m2.sim AS semantic
              FROM m1
              JOIN dists d0 ON d0.src = {v_q} AND d0.dst = m1.poi
              JOIN m2 ON m2.poi <> m1.poi
              JOIN dists d1 ON d1.src = m1.poi AND d1.dst = m2.poi
            )
            SELECT DISTINCT ROUND(length, 6) AS length, ROUND(semantic, 6) AS semantic
            FROM cand c
            WHERE NOT EXISTS (
              SELECT 1 FROM cand o
              WHERE (o.length < c.length - 1e-9 AND o.semantic <= c.semantic + 1e-9)
                 OR (o.semantic < c.semantic - 1e-9 AND o.length <= c.length + 1e-9)
            )
            """,
            dists=dists,
            m1=m1,
            m2=m2,
        )
