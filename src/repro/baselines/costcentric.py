"""Cost-centric baselines: *Shortest* and *Fastest* (Sec. VII-C).

Plain Dijkstra on the DI respectively TT weight functions; Fastest honours
the departure period via the peak congestion factors (the paper passes the
departure time to the fastest-path computation).
"""
from __future__ import annotations

from dataclasses import dataclass

from ..roadnet.model import RoadNetwork
from ..roadnet.shortest_path import dijkstra


@dataclass
class ShortestRouter:
    """Lowest-distance path (Dijkstra on DI)."""

    net: RoadNetwork

    def __post_init__(self):
        self._w = self.net.dist

    def route(self, s: int, d: int, peak: bool = False, driver: int = 0) -> list[int]:
        res = dijkstra(self.net, s, d, self._w)
        return res[0] if res else [s]


@dataclass
class FastestRouter:
    """Lowest-travel-time path (Dijkstra on TT, peak-aware)."""

    net: RoadNetwork

    def __post_init__(self):
        self._w_off = self.net.travel_time(peak=False)
        self._w_peak = self.net.travel_time(peak=True)

    def route(self, s: int, d: int, peak: bool = False, driver: int = 0) -> list[int]:
        res = dijkstra(self.net, s, d, self._w_peak if peak else self._w_off)
        return res[0] if res else [s]
