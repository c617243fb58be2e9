"""Bench target for the offline processing times of Sec. VII-C — the full
region-graph + Steps 1–3 build on the bench-scale training split."""
from repro.core.pipeline import build_l2r


def test_offline_pipeline_build(benchmark, spark, bench_city, bench_trajs):
    train, _ = bench_trajs

    arts = benchmark.pedantic(
        lambda: build_l2r(spark, bench_city, train), rounds=1, iterations=1
    )
    assert arts.router.rg.n_regions > 0
    print("stage timings (s):", arts.timings_s)
