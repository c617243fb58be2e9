"""Bench target for Table II — the Spark distance-bucket aggregation."""
from repro.traj.generator import trajectories_df
from repro.traj.stats import D2_BUCKETS, distance_table_pdf


def test_table2_distance_table(benchmark, spark, bench_trajs):
    train, test = bench_trajs
    df = trajectories_df(spark, train + test).cache()
    df.count()  # materialise outside the timed region

    result = benchmark.pedantic(lambda: distance_table_pdf(df, D2_BUCKETS), rounds=3, iterations=1)
    assert result.n_trajectories.sum() == len(train) + len(test)
