"""TRIP [27] — personalized travel-time baseline (substitution, DESIGN.md).

TRIP models personalized travel times as ratios between a driver's times
and average times, then runs fastest-path search on the personalized
weights. Our trajectories carry model travel times rather than measured
per-driver speeds, so the personalized ratio is derived from the signal
that *is* per-driver in the data: each driver's road-type usage shares.
A road type the driver uses often gets a discounted perceived travel time
(they "drive it faster"), biasing the fastest path toward the driver's
habitual roads — a single-objective personalized search with the same
query cost as Fastest, as in the paper (Fig. 12: TRIP ≈ Fastest runtime).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from ..roadnet.model import ROAD_TYPES, RoadNetwork
from ..roadnet.shortest_path import dijkstra
from ..traj.generator import Trajectory

_GAMMA = 0.3  # max perceived-time discount on a driver's dominant road type


@dataclass
class TripRouter:
    net: RoadNetwork
    driver_ratio: dict[int, np.ndarray] = field(default_factory=dict)

    def __post_init__(self):
        self._tt = {False: self.net.travel_time(peak=False), True: self.net.travel_time(peak=True)}

    def fit(self, train: list[Trajectory]) -> "TripRouter":
        use: dict[int, np.ndarray] = {}
        for t in train:
            eids = self.net.path_edges(t.path)
            counts = np.bincount(self.net.rt[eids].astype(np.int64), minlength=len(ROAD_TYPES)).astype(float)
            use[t.driver] = use.get(t.driver, 0) + counts
        for drv, counts in use.items():
            share = counts / max(counts.sum(), 1.0)
            self.driver_ratio[drv] = 1.0 - _GAMMA * share
        return self

    def route(self, s: int, d: int, peak: bool = False, driver: int = 0) -> list[int]:
        ratio = self.driver_ratio.get(driver)
        w = self._tt[peak]
        if ratio is not None:
            w = w * ratio[self.net.rt.astype(np.int64)]
        res = dijkstra(self.net, s, d, w)
        return res[0] if res else [s]
