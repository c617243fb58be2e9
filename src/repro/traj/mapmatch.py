"""HMM-lite map matcher (substitute for Newson & Krumm [29]).

Aligns a noisy GPS sequence with a road-network vertex path. Emission
favours vertices close to the fix; transition favours successive candidate
vertices whose network distance agrees with the fix displacement (the core
idea of the HMM matcher the paper uses). Viterbi over a small candidate
set per fix, then consecutive matched vertices are connected by shortest
paths to yield a contiguous road-network path.
"""
from __future__ import annotations

import numpy as np

from ..roadnet.model import RoadNetwork
from ..roadnet.shortest_path import dijkstra


def _candidates(net: RoadNetwork, pt: np.ndarray, k: int) -> np.ndarray:
    d2 = ((net.xy - pt[None, :]) ** 2).sum(axis=1)
    return np.argsort(d2)[:k]


def map_match(
    net: RoadNetwork,
    gps: np.ndarray,
    k: int = 5,
    sigma_m: float = 15.0,
    beta: float = 0.3,
) -> list[int]:
    """Match (k, 3) GPS fixes to a road-network vertex path.

    ``sigma_m`` is the GPS noise scale for the Gaussian emission;
    ``beta`` weights the |euclidean displacement − network distance|
    transition penalty (per metre, log-domain).
    """
    pts = gps[:, :2]
    n = len(pts)
    cand = [_candidates(net, pts[i], k) for i in range(n)]
    # Viterbi in log-domain.
    emis = [
        -(((net.xy[c] - pts[i][None, :]) ** 2).sum(axis=1)) / (2 * sigma_m**2)
        for i, c in enumerate(cand)
    ]
    score = emis[0].copy()
    back: list[np.ndarray] = []
    for i in range(1, n):
        step = np.linalg.norm(pts[i] - pts[i - 1])
        prev_xy = net.xy[cand[i - 1]]
        cur_xy = net.xy[cand[i]]
        # Straight-line candidate-to-candidate distance approximates the
        # network distance on a dense planar network; exact network
        # distances would add k² Dijkstras per fix for little gain here.
        dmat = np.linalg.norm(cur_xy[:, None, :] - prev_xy[None, :, :], axis=2)
        trans = -beta * np.abs(dmat - step)
        total = score[None, :].T + trans.T  # (prev, cur)
        back.append(np.argmax(total, axis=0))
        score = emis[i] + np.max(total, axis=0)
    # Backtrace.
    states = [int(np.argmax(score))]
    for i in range(n - 1, 0, -1):
        states.append(int(back[i - 1][states[-1]]))
    states.reverse()
    matched = [int(cand[i][s]) for i, s in enumerate(states)]
    # Stitch into a contiguous path with shortest-path connectors.
    path: list[int] = [matched[0]]
    for v in matched[1:]:
        if v == path[-1]:
            continue
        res = dijkstra(net, path[-1], v, net.dist)
        if res is None:
            continue
        path.extend(res[0][1:])
    return path
