"""The provided TPC-H-lite generators + DuckDB oracle harness.

The SkySR paper's data is spatial (see ``repro.graphs``), but the repo's
relational harness must stay healthy: these tests run Spark SQL over the
provided generators and diff against DuckDB through ``assert_equivalent``,
and pin the spatial re-exports in ``repro.synth_data``.
"""
from __future__ import annotations

import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002).cache()


@pytest.fixture(scope="module")
def orders_df(spark):
    return synth_data.orders(spark, sf=0.002).cache()


class TestOracleHarness:
    def test_filter_aggregate(self, spark, li):
        got = (
            li.where(F.col("l_quantity") > 25)
            .groupBy("l_returnflag")
            .agg(
                F.count(F.lit(1)).alias("n"),
                F.round(F.sum("l_extendedprice"), 2).alias("revenue"),
            )
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, COUNT(*) AS n,
                   ROUND(SUM(l_extendedprice), 2) AS revenue
            FROM li WHERE l_quantity > 25 GROUP BY l_returnflag
            """,
            li=li,
        )

    def test_join_shuffle_path(self, spark, li, orders_df):
        got = (
            li.join(orders_df, li.l_orderkey == orders_df.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count(F.lit(1)).alias("n"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, COUNT(*) AS n
            FROM li JOIN o ON li.l_orderkey = o.o_orderkey
            GROUP BY o_orderpriority
            """,
            li=li,
            o=orders_df,
        )

    def test_zipf_keys_are_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100)
        top = df.groupBy("k").count().orderBy(F.desc("count")).first()
        assert top["count"] > 5000 / 100 * 5  # heavy head

    def test_uniform_keys_cover_range(self, spark):
        df = synth_data.uniform_keys(spark, n=2000, n_keys=10)
        assert df.select("k").distinct().count() == 10


class TestSpatialReexports:
    def test_spatial_dataset(self):
        ds = synth_data.spatial_dataset("tokyo-lite", scale=0.03)
        assert ds.graph.n_pois > 0

    def test_forest_reexports(self):
        assert synth_data.foursquare_lite_forest().n_trees == 10
        assert synth_data.depth2_forest(2, 2).n_categories == 6
        assert synth_data.generated_forest(2).n_trees == 2

    def test_graph_builder_reexports(self):
        g = synth_data.graph_from_edges(2, [(0, 1, 1.0)], {})
        assert g.n_edges == 1
        g2 = synth_data.road_network(
            n_road=30, n_edges_road=35, n_pois=5,
            forest=synth_data.foursquare_lite_forest(), seed=0,
        )
        assert g2.n_pois == 5
