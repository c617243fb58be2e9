"""Bench target for Table IV — popularity aggregation + Algorithm 1 +
convex-hull region statistics."""
from repro.core.clustering import bottom_up_clustering
from repro.core.popularity import edge_popularity_array
from repro.core.region_graph import region_size_table
from repro.traj.generator import trajectories_df


def test_table4_clustering_and_sizes(benchmark, spark, bench_city, bench_trajs):
    train, _ = bench_trajs
    df = trajectories_df(spark, train).cache()
    df.count()

    def run():
        pop = edge_popularity_array(df, bench_city.net, spark)
        regions = bottom_up_clustering(bench_city.net, pop)
        return region_size_table(bench_city.net, [r.vertices for r in regions])

    tbl = benchmark.pedantic(run, rounds=2, iterations=1)
    assert tbl.n_regions.sum() > 0
