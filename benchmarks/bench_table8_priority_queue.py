"""Table 8 benchmark: full BSSR under the proposed vs distance-based queue;
visited-vertex counts land in extra_info."""
import pytest

from repro.core.bssr import BSSROptions, bssr


@pytest.mark.parametrize("size", [2, 3, 4])
@pytest.mark.parametrize("mode", ["proposed", "distance"])
def test_pq_mode(benchmark, bench_world, bench_queries, size, mode):
    ds = bench_world
    q = bench_queries[size][0]
    res = benchmark.pedantic(
        lambda: bssr(
            ds.graph, ds.forest, q.v_q, list(q.seq_cats), options=BSSROptions(pq_mode=mode)
        ),
        rounds=2,
        iterations=1,
    )
    benchmark.extra_info["visited"] = res.stats.visited_vertices
    benchmark.extra_info["n_skysr"] = len(res.routes)
