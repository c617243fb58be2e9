"""Bench target for Fig. 12 — per-router online routing time.

pytest-benchmark times each router over the same fixed query batch; the
per-router means are the Fig. 12 rows."""
import pytest

from repro.baselines.costcentric import FastestRouter, ShortestRouter
from repro.baselines.dom import DomRouter
from repro.baselines.trip import TripRouter

N_QUERIES = 60


def _queries(bench_trajs):
    _, test = bench_trajs
    return [(t.path[0], t.path[-1], t.peak, t.driver) for t in test[:N_QUERIES]]


@pytest.fixture(scope="module")
def routers(bench_city, bench_trajs, bench_arts):
    train, _ = bench_trajs
    return {
        "L2R": bench_arts.router,
        "Shortest": ShortestRouter(bench_city.net),
        "Fastest": FastestRouter(bench_city.net),
        "Dom": DomRouter(bench_city.net).fit(train),
        "TRIP": TripRouter(bench_city.net).fit(train),
    }


@pytest.mark.parametrize("name", ["L2R", "Shortest", "Fastest", "Dom", "TRIP"])
def test_fig12_routing_time(benchmark, name, routers, bench_trajs):
    router = routers[name]
    qs = _queries(bench_trajs)

    def run():
        for s, d, peak, driver in qs:
            router.route(s, d, peak=peak, driver=driver)

    benchmark.pedantic(run, rounds=3, iterations=1)
