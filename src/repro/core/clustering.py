"""Trajectory-based road-network clustering — paper Algorithm 1 (Sec. IV-A).

Bottom-up agglomerative clustering of the *trajectory graph* (vertices and
edges traversed by at least one trajectory) driven by modularity gain

    ΔQ_{v_i v_j} = s_ij / S − (S_i · S_j) / S²    (edge present, else 0)

with the road-type merge conditions of Table I:

    ===========  ============  =========================
    v_j \\ v_k    simple        aggregate
    ===========  ============  =========================
    simple       (none)        v_k.RT == w_RT(v_k, v_j)
    aggregate    v_j.RT == w_RT(v_k, v_j)   v_j.RT == v_k.RT
    ===========  ============  =========================

The edge-popularity input (s_ij) is produced by the Spark aggregation in
:mod:`repro.core.popularity`; the merge loop itself is an inherently
sequential priority-queue algorithm over the reduced trajectory graph and
runs on the driver (DESIGN.md §5). When two clusters end up connected by
several original edges, the combined inter-cluster edge sums their
popularities and keeps the road type only if all constituents agree
(otherwise it is marked mixed and can never satisfy an RT condition).
"""
from __future__ import annotations

import heapq
import itertools
from dataclasses import dataclass, field

import numpy as np

from ..roadnet.model import RoadNetwork

_MIXED_RT = -2  # inter-cluster edge whose constituent road types disagree


@dataclass
class Region:
    """A cluster produced by Algorithm 1."""

    rid: int
    vertices: np.ndarray  # original road-network vertex ids
    rt: int | None  # aggregate road type; None for a singleton simple vertex
    popularity: float


@dataclass
class _Cluster:
    members: list[int]
    S: float
    rt: int | None  # None while the cluster is a simple vertex
    simple: bool
    adj: dict[int, list] = field(default_factory=dict)  # cid -> [s_sum, rt]


def modularity_gain(s_ij: float, S_i: float, S_j: float, S: float) -> float:
    """ΔQ for merging two connected clusters."""
    return s_ij / S - (S_i * S_j) / (S * S)


def _check_q(vk: _Cluster, vj: _Cluster, edge_rt: int, dq: float) -> bool:
    """CheckQ: positive modularity gain plus the Table I RT condition."""
    if dq <= 0:
        return False
    if vk.simple and vj.simple:
        return True
    if (not vk.simple) and vj.simple:
        return vk.rt == edge_rt
    if vk.simple and (not vj.simple):
        return vj.rt == edge_rt
    return vk.rt == vj.rt


def bottom_up_clustering(net: RoadNetwork, edge_pop: np.ndarray) -> list[Region]:
    """Run Algorithm 1 on the trajectory graph implied by ``edge_pop``.

    ``edge_pop[e] > 0`` marks edge e as trajectory-covered. Returns the
    cluster set VC as :class:`Region` objects covering exactly the
    trajectory-covered vertices.
    """
    covered_edges = np.flatnonzero(edge_pop > 0)
    S_total = float(edge_pop[covered_edges].sum())
    if S_total == 0:
        return []

    clusters: dict[int, _Cluster] = {}
    cid_of_vertex: dict[int, int] = {}
    next_cid = itertools.count()

    for e in covered_edges:
        for v in (int(net.eu[e]), int(net.ev[e])):
            if v not in cid_of_vertex:
                cid = next(next_cid)
                cid_of_vertex[v] = cid
                clusters[cid] = _Cluster(members=[v], S=0.0, rt=None, simple=True)
    for e in covered_edges:
        cu, cv = cid_of_vertex[int(net.eu[e])], cid_of_vertex[int(net.ev[e])]
        s = float(edge_pop[e])
        rt = int(net.rt[e])
        clusters[cu].S += s
        clusters[cv].S += s
        for a, b in ((cu, cv), (cv, cu)):
            ent = clusters[a].adj.get(b)
            if ent is None:
                clusters[a].adj[b] = [s, rt]
            else:  # parallel original edges between the same vertex pair
                ent[0] += s
                ent[1] = ent[1] if ent[1] == rt else _MIXED_RT

    # Priority queue by popularity, lazy deletion via an alive-set.
    pq: list[tuple[float, int]] = [(-c.S, cid) for cid, c in clusters.items()]
    heapq.heapify(pq)
    alive = set(clusters)
    regions: list[Region] = []

    while pq:
        negS, k = heapq.heappop(pq)
        if k not in alive or -negS != clusters[k].S:
            continue
        vk = clusters[k]
        if not vk.adj:  # line 19: no adjacent vertices -> region
            alive.discard(k)
            regions.append(
                Region(
                    rid=len(regions),
                    vertices=np.asarray(sorted(vk.members), dtype=np.int64),
                    rt=vk.rt,
                    popularity=vk.S,
                )
            )
            continue

        # Lines 8-10: qualification check.
        VA = list(vk.adj.keys())
        VB = [
            j
            for j in VA
            if _check_q(
                vk,
                clusters[j],
                vk.adj[j][1],
                modularity_gain(vk.adj[j][0], vk.S, clusters[j].S, S_total),
            )
        ]

        # Line 11: merge selection.
        if not vk.simple:
            VBp = VB  # Table I already forces RT agreement
            new_rt = vk.rt
        else:
            # Largest subset of VB whose incident edges share one road type.
            by_rt: dict[int, list[int]] = {}
            for j in VB:
                rt = vk.adj[j][1]
                if rt != _MIXED_RT:
                    by_rt.setdefault(rt, []).append(j)
            if by_rt:
                new_rt, VBp = max(by_rt.items(), key=lambda kv: (len(kv[1]), -kv[0]))
            else:
                new_rt, VBp = None, []

        # Lines 12-13: cut the graph between v_k and VA \ VB'.
        for j in VA:
            if j not in VBp:
                vk.adj.pop(j, None)
                clusters[j].adj.pop(k, None)

        if not VBp:
            # All edges cut; v_k will pop again with empty adjacency.
            heapq.heappush(pq, (-vk.S, k))
            continue

        # Lines 14-17: merge v_k with every vertex in VB'.
        merged = [k] + VBp
        nid = next(next_cid)
        members: list[int] = []
        S_new = 0.0
        for cid in merged:
            members.extend(clusters[cid].members)
            S_new += clusters[cid].S
            alive.discard(cid)
        new_adj: dict[int, list] = {}
        for cid in merged:
            for nb, (s, rt) in clusters[cid].adj.items():
                if nb in merged:
                    continue
                ent = new_adj.get(nb)
                if ent is None:
                    new_adj[nb] = [s, rt]
                else:
                    ent[0] += s
                    ent[1] = ent[1] if ent[1] == rt else _MIXED_RT
        nc = _Cluster(members=members, S=S_new, rt=new_rt, simple=False, adj=new_adj)
        clusters[nid] = nc
        alive.add(nid)
        for nb, ent in new_adj.items():
            # Rewire neighbours to the new aggregate vertex.
            for cid in merged:
                clusters[nb].adj.pop(cid, None)
            clusters[nb].adj[nid] = [ent[0], ent[1]]
        heapq.heappush(pq, (-nc.S, nid))

    return regions


def vertex_region_map(net: RoadNetwork, regions: list[Region]) -> np.ndarray:
    """(n_vertices,) array: region id per vertex, −1 where uncovered."""
    m = np.full(net.n_vertices, -1, dtype=np.int64)
    for r in regions:
        m[r.vertices] = r.rid
    return m
