"""Table 9 benchmark: the §7.5 usecase query (same-tree categories +
destination) on tokyo-lite."""
from repro.core.bssr import bssr
from repro.tables.table9 import pick_usecase_query


def test_usecase_query(benchmark, bench_world):
    ds = bench_world
    seq = pick_usecase_query(ds)
    v_q = ds.graph.n_road // 2
    dest = ds.graph.n_road // 3
    res = benchmark(lambda: bssr(ds.graph, ds.forest, v_q, seq, destination=dest))
    benchmark.extra_info["n_skysr"] = len(res.routes)
