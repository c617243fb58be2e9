"""GoogleSim — surrogate for the Google Directions comparison (Sec. VII-D).

The Directions API is closed; what matters for the paper's comparison is
that a *global* routing service (a) has its own travel-time model that
does not match local ground truth exactly, (b) biases toward major roads,
and (c) knows nothing about local drivers' region-pair preferences. The
surrogate routes fastest-path under a privately perturbed speed model with
a major-road discount, and answers with a *way-point polyline* (coordinate
pairs, sub-sampled and jittered) — so it must be scored with the paper's
10 m-band way-point matching (:mod:`repro.eval.band_match`), not by edge
identity.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from ..roadnet.model import PEAK_FACTOR, SPEED_KMH, RoadNetwork
from ..roadnet.shortest_path import dijkstra

_MAJOR_BIAS = 0.92  # service prefers motorway/trunk/primary
_SPEED_SIGMA = 0.15  # log-normal error of the service's per-road-type speeds


@dataclass
class GoogleSimRouter:
    net: RoadNetwork
    seed: int = 29

    def __post_init__(self):
        g = np.random.default_rng(self.seed)
        speeds = SPEED_KMH * np.exp(g.normal(0.0, _SPEED_SIGMA, size=len(SPEED_KMH)))
        rt = self.net.rt.astype(np.int64)
        base = self.net.dist / (speeds[rt] / 3.6)
        # Per-edge error: the service's map/speed data differs edge-by-edge
        # from local ground truth (historic speeds, stale map, etc.).
        base *= np.exp(g.normal(0.0, 0.10, size=self.net.n_edges))
        bias = np.where(rt <= 2, _MAJOR_BIAS, 1.0)
        self._w_off = base * bias
        self._w_peak = base * PEAK_FACTOR[rt] * bias

    def route(self, s: int, d: int, peak: bool = False, driver: int = 0) -> list[int]:
        res = dijkstra(self.net, s, d, self._w_peak if peak else self._w_off)
        return res[0] if res else [s]

    def waypoints(self, path: list[int], every: int = 3, noise_m: float = 3.0, seed: int = 0) -> np.ndarray:
        """The service's answer format: sub-sampled, jittered coordinates."""
        g = np.random.default_rng(seed)
        idx = list(range(0, len(path), every))
        if idx[-1] != len(path) - 1:
            idx.append(len(path) - 1)
        pts = self.net.xy[np.asarray([path[i] for i in idx])].astype(float).copy()
        pts += g.normal(0.0, noise_m, size=pts.shape)
        return pts
