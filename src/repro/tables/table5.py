"""Table 5 — dataset summary: |V|, |P|, |E| per map, paper vs generated.

Our presets track the paper's shape at 1/100 scale (Cal: 1/10); the row
layout mirrors the paper's Table 5 with the reproduction columns appended.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.graphs.generator import PAPER_TABLE5
from repro.tables.common import DATASETS, env_scale, get_dataset


def rows(spark: SparkSession | None = None, *, scale: float | None = None) -> list[dict]:
    scale = env_scale(1.0) if scale is None else scale
    out = []
    for name in DATASETS:
        ds = get_dataset(name, scale)
        area, pv, pp, pe = PAPER_TABLE5[name]
        n_v, n_p, n_e = ds.graph.n_road, ds.graph.n_pois, ds.graph.n_edges
        if spark is not None:
            # Exercise the Spark ingest path: counts must agree with the
            # in-memory graph (the oracle-checked relational view).
            from repro.core.skysr_spark import dataset_tables

            t = dataset_tables(spark, ds)
            n_p = t["pois"].count()
            n_e = t["edges"].count()
        out.append(
            {
                "Dataset": ds.name,
                "Area": area,
                "paper |V|": pv,
                "paper |P|": pp,
                "paper |E|": pe,
                "ours |V|": n_v,
                "ours |P|": n_p,
                "ours |E|": n_e,
                "categories": ds.forest.n_categories,
                "trees": ds.forest.n_trees,
            }
        )
    return out


COLUMNS = [
    "Dataset", "Area", "paper |V|", "paper |P|", "paper |E|",
    "ours |V|", "ours |P|", "ours |E|", "categories", "trees",
]
