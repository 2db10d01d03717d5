"""Table 5 benchmark: dataset generation and Spark ingest throughput."""
import pytest

from repro.core.skysr_spark import dataset_tables
from repro.graphs.generator import dataset


@pytest.mark.parametrize("name", ["tokyo-lite", "nyc-lite", "cal-lite"])
def test_generate_dataset(benchmark, name):
    ds = benchmark(lambda: dataset(name, scale=0.25))
    benchmark.extra_info["V"] = ds.graph.n_road
    benchmark.extra_info["P"] = ds.graph.n_pois
    benchmark.extra_info["E"] = ds.graph.n_edges


def test_spark_ingest(benchmark, spark):
    ds = dataset("tokyo-lite", scale=0.25)

    def ingest():
        t = dataset_tables(spark, ds)
        return t["edges"].count() + t["pois"].count()

    n = benchmark.pedantic(ingest, rounds=3, iterations=1)
    benchmark.extra_info["rows"] = n
