"""GPS record simulation.

Turns a road-network path into a time-ordered sequence of noisy GPS fixes
at a configurable sampling rate — the raw input the paper's datasets
provide (D1 at 1 Hz, D2 at 0.03–0.1 Hz). Together with
:mod:`repro.traj.mapmatch` this exercises the map-matching stage of the
pipeline; the learning stages then consume matched paths, exactly as the
paper consumes the output of [29].
"""
from __future__ import annotations

import numpy as np

from ..roadnet.model import RoadNetwork


def sample_gps(
    net: RoadNetwork,
    path: list[int],
    hz: float = 0.1,
    noise_m: float = 8.0,
    peak: bool = False,
    seed: int = 0,
) -> np.ndarray:
    """Sample GPS fixes along ``path``.

    Returns an (k, 3) array of (x, y, t_seconds). The vehicle moves at the
    per-edge model speed; fixes are taken every ``1/hz`` seconds and
    perturbed with isotropic Gaussian noise of ``noise_m`` metres.
    """
    g = np.random.default_rng(seed)
    tt = net.travel_time(peak=peak)
    eids = net.path_edges(path)
    # Cumulative time at each path vertex.
    t_at = np.concatenate([[0.0], np.cumsum(tt[eids])])
    total = t_at[-1]
    times = np.arange(0.0, total + 1e-9, 1.0 / hz)
    if len(times) < 2:
        times = np.array([0.0, total])
    pts = []
    for t in times:
        i = int(np.searchsorted(t_at, t, side="right") - 1)
        i = min(i, len(eids) - 1)
        frac = 0.0 if tt[eids[i]] == 0 else (t - t_at[i]) / tt[eids[i]]
        frac = min(max(frac, 0.0), 1.0)
        a, b = path[i], path[i + 1]
        xy = net.xy[a] + frac * (net.xy[b] - net.xy[a])
        pts.append([xy[0], xy[1], t])
    pts = np.asarray(pts)
    pts[:, :2] += g.normal(0.0, noise_m, size=(len(pts), 2))
    return pts
