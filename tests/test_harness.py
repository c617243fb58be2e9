"""Tests for the evaluation harness (per-query fan-out + aggregations)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.baselines.costcentric import FastestRouter, ShortestRouter
from repro.eval.harness import (
    CATEGORIES,
    accuracy_by_bucket,
    accuracy_by_category,
    category_of,
    evaluate,
    pivot_pdf,
    runtime_table,
)
from repro.oracle import assert_equivalent
from repro.roadnet.generator import make_city
from repro.traj.generator import generate_trajectories
from repro.traj.stats import D2_BUCKETS


@pytest.fixture(scope="module")
def city():
    return make_city(grid_n=15, cell_m=250.0, seed=5)


@pytest.fixture(scope="module")
def results(city, spark):
    trajs = generate_trajectories(city, n=40, n_drivers=8, seed=11)
    vr = np.full(city.net.n_vertices, -1)
    vr[: city.net.n_vertices // 2] = 0  # synthetic region membership
    routers = {"Shortest": ShortestRouter(city.net), "Fastest": FastestRouter(city.net)}
    return evaluate(spark, routers, trajs, city.net, vr).cache(), trajs


def test_category_of():
    vr = np.array([0, -1, 2])
    assert category_of(vr, 0, 2) == "InRegion"
    assert category_of(vr, 0, 1) == "InOutRegion"
    assert category_of(vr, 1, 1) == "OutRegion"


def test_results_shape(results):
    df, trajs = results
    assert df.count() == 2 * len(trajs)
    assert set(r["router"] for r in df.select("router").distinct().collect()) == {"Shortest", "Fastest"}


def test_sims_in_unit_interval(results):
    df, _ = results
    row = df.agg(F.min("sim1"), F.max("sim1"), F.min("sim4"), F.max("sim4")).first()
    assert 0.0 <= row[0] and row[1] <= 1.0
    assert 0.0 <= row[2] and row[3] <= 1.0


def test_eq4_le_eq1(results):
    df, _ = results
    assert df.where(F.col("sim4") > F.col("sim1") + 1e-9).count() == 0


def test_runtime_positive(results):
    df, _ = results
    assert df.where(F.col("ms") <= 0).count() == 0


def test_categories_valid(results):
    df, _ = results
    cats = {r["category"] for r in df.select("category").distinct().collect()}
    assert cats <= set(CATEGORIES)


def test_accuracy_by_category_oracle(results):
    df, _ = results
    out = accuracy_by_category(df).select("router", "category", "acc_eq1", "n")
    sql = """
        SELECT router, category,
               ROUND(AVG(sim1), 3) AS acc_eq1,
               COUNT(*) AS n
        FROM t GROUP BY router, category
    """
    assert_equivalent(out, sql, t=df)


def test_runtime_table_oracle(results):
    df, _ = results
    out = runtime_table(df)
    sql = """
        SELECT router, category, ROUND(AVG(ms), 2) AS mean_ms, COUNT(*) AS n
        FROM t GROUP BY router, category
    """
    assert_equivalent(out, sql, t=df)


def test_accuracy_by_bucket_covers_all_rows(results):
    df, trajs = results
    tbl = accuracy_by_bucket(df, D2_BUCKETS).toPandas()
    assert tbl.n.sum() == 2 * len(trajs)


def test_pivot(results):
    df, _ = results
    p = pivot_pdf(accuracy_by_category(df), "router", "category", "acc_eq1")
    assert set(p.index) == {"Shortest", "Fastest"}
