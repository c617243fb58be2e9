"""Path similarity functions pSim — paper Eq. 1 and Eq. 4.

Both compare a constructed path against a ground-truth path by shared edge
length; Eq. 1 normalises by the ground-truth length, Eq. 4 by the length
of the union of both paths' edges.
"""
from __future__ import annotations

from ..roadnet.model import RoadNetwork


def _edge_sets(net: RoadNetwork, gt: list[int], cand: list[int]) -> tuple[set, set]:
    gt_e = set(map(int, net.path_edges(gt))) if len(gt) > 1 else set()
    ca_e = set(map(int, net.path_edges(cand))) if len(cand) > 1 else set()
    return gt_e, ca_e


def psim(net: RoadNetwork, gt: list[int], cand: list[int]) -> float:
    """Eq. 1: shared edge length / ground-truth path length."""
    gt_e, ca_e = _edge_sets(net, gt, cand)
    denom = sum(net.dist[e] for e in gt_e)
    if denom == 0:
        return 1.0 if not ca_e else 0.0
    # min() guards float summation-order noise pushing the ratio past 1.
    return min(1.0, sum(net.dist[e] for e in gt_e & ca_e) / denom)


def psim_union(net: RoadNetwork, gt: list[int], cand: list[int]) -> float:
    """Eq. 4: shared edge length / union edge length (symmetric variant)."""
    gt_e, ca_e = _edge_sets(net, gt, cand)
    denom = sum(net.dist[e] for e in gt_e | ca_e)
    if denom == 0:
        return 1.0
    return min(1.0, sum(net.dist[e] for e in gt_e & ca_e) / denom)
