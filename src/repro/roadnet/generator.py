"""Synthetic hierarchical city generator (substitute for OSM networks).

The paper evaluates on OSM extracts of Denmark and Chengdu. We build a
planar city with the same *structural* ingredients the algorithms consume:

* a road-type hierarchy — an outer motorway ring, trunk crosses, a
  primary/secondary arterial grid, and a dense residential mesh;
* coordinates in metres (centroid distances, convex hulls, Table IV);
* zone functionalities (center / business / industrial / residential) that
  drive both trip demand and the latent routing preferences used by the
  trajectory generator (DESIGN.md §3).

Coordinates are jittered so edge lengths vary; the lattice is never
disconnected by construction.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from .model import RT_CODE, RoadNetwork

ZONE_FUNCS = ["residential", "business", "industrial", "center"]


@dataclass
class City:
    """A generated road network plus its zone annotation.

    ``zone_of`` maps vertex id -> zone id; ``zone_func`` maps zone id ->
    functionality name; ``zone_centroid`` is (n_zones, 2) in metres.

    ``local_cost_factor`` is a hidden per-edge multiplier on travel costs
    that only *drivers* (the trajectory generator) perceive — construction,
    potholes, school zones, shortcuts. It encodes the paper's premise
    (via [17]) that local-driver paths are neither exactly fastest nor
    exactly shortest under the model costs: routing algorithms see the
    clean model weights; ground-truth trajectories optimise the perturbed
    ones. Trajectory-based routing can recover this local knowledge from
    the paths themselves, cost-centric routing cannot.
    """

    net: RoadNetwork
    grid_n: int
    cell_m: float
    zone_of: np.ndarray
    zone_func: list[str]
    local_cost_factor: np.ndarray = field(default=None)
    zone_centroid: np.ndarray = field(default=None)

    def __post_init__(self):
        if self.local_cost_factor is None:
            self.local_cost_factor = np.ones(self.net.n_edges)
        if self.zone_centroid is None:
            nz = len(self.zone_func)
            cent = np.zeros((nz, 2))
            for z in range(nz):
                cent[z] = self.net.xy[self.zone_of == z].mean(axis=0)
            self.zone_centroid = cent


def _zone_function(zr: int, zc: int, n_zones_side: int) -> str:
    """Deterministic functionality layout: centre block(s) are 'center',
    the ring around them 'business', corner blocks 'industrial', the rest
    'residential' — mirrors the monocentric-city intuition the paper's
    preference-transfer examples use (city centre vs suburbs)."""
    mid = (n_zones_side - 1) / 2.0
    d = max(abs(zr - mid), abs(zc - mid))
    corner = (zr in (0, n_zones_side - 1)) and (zc in (0, n_zones_side - 1))
    if d <= max(0.5, n_zones_side / 6.0):
        return "center"
    if corner:
        return "industrial"
    if d <= n_zones_side / 3.0:
        return "business"
    return "residential"


def make_city(
    grid_n: int = 30,
    cell_m: float = 250.0,
    zone_cells: int = 6,
    seed: int = 7,
    local_cost_sigma: float = 0.10,
) -> City:
    """Build a ``grid_n`` × ``grid_n`` lattice city.

    Road-type assignment (codes from ``ROAD_TYPES``):
      * border ring -> motorway;
      * the two central axes -> trunk;
      * every 8th row/col -> primary, every 4th -> secondary;
      * everything else -> residential (a sprinkle of tertiary).
    """
    g = np.random.default_rng(seed)
    n = grid_n * grid_n

    # Jittered lattice coordinates (metres).
    rows, cols = np.divmod(np.arange(n), grid_n)
    xy = np.stack([cols * cell_m, rows * cell_m], axis=1).astype(np.float64)
    xy += g.uniform(-0.12 * cell_m, 0.12 * cell_m, size=(n, 2))

    def vid(r: int, c: int) -> int:
        return r * grid_n + c

    eu, ev, rt = [], [], []
    mid1, mid2 = grid_n // 2, grid_n // 2  # central axes

    def classify(r1, c1, r2, c2) -> int:
        # Horizontal edge lies on row r1 (r1==r2); vertical on col c1.
        if r1 == r2:  # horizontal
            line = r1
            on_border = line in (0, grid_n - 1)
        else:  # vertical
            line = c1
            on_border = line in (0, grid_n - 1)
        if on_border:
            return RT_CODE["motorway"]
        if line in (mid1, mid2):
            return RT_CODE["trunk"]
        if line % 8 == 0:
            return RT_CODE["primary"]
        if line % 4 == 0:
            return RT_CODE["secondary"]
        if line % 4 == 2 and g.random() < 0.3:
            return RT_CODE["tertiary"]
        return RT_CODE["residential"]

    for r in range(grid_n):
        for c in range(grid_n):
            if c + 1 < grid_n:
                eu.append(vid(r, c)); ev.append(vid(r, c + 1)); rt.append(classify(r, c, r, c + 1))
            if r + 1 < grid_n:
                eu.append(vid(r, c)); ev.append(vid(r + 1, c)); rt.append(classify(r, c, r + 1, c))

    eu = np.asarray(eu); ev = np.asarray(ev); rt = np.asarray(rt)
    dist = np.linalg.norm(xy[eu] - xy[ev], axis=1)
    net = RoadNetwork.from_edges(xy, eu, ev, dist, rt)

    # Zones: blocks of zone_cells × zone_cells lattice cells.
    n_zones_side = int(np.ceil(grid_n / zone_cells))
    zr, zc = rows // zone_cells, cols // zone_cells
    zone_of = (zr * n_zones_side + zc).astype(np.int64)
    # Compact zone ids (the last row/col block may be smaller, ids stay dense).
    uniq, zone_of = np.unique(zone_of, return_inverse=True)
    zone_func = []
    for u in uniq:
        r, c = divmod(int(u), n_zones_side)
        zone_func.append(_zone_function(r, c, n_zones_side))
    local = np.exp(g.normal(0.0, local_cost_sigma, size=net.n_edges))
    return City(
        net=net, grid_n=grid_n, cell_m=cell_m, zone_of=zone_of,
        zone_func=zone_func, local_cost_factor=local,
    )
