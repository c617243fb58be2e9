"""Property-based tests (hypothesis) for the numeric/graph kernels."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.clustering import modularity_gain
from repro.core.region_graph import _convex_hull, _segments
from repro.core.routing import _dedupe
from repro.core.transfer import _conjugate_gradient, _decode, _one_hot
from repro.roadnet.model import COSTS


@settings(max_examples=40, deadline=None)
@given(st.integers(2, 25), st.integers(0, 10_000))
def test_cg_property(n, seed):
    g = np.random.default_rng(seed)
    R = g.normal(size=(n, n))
    A = R @ R.T + (n + 1) * np.eye(n)
    b = g.normal(size=n)
    x = _conjugate_gradient(A, b)
    assert np.allclose(A @ x, b, atol=1e-5)


@settings(max_examples=50, deadline=None)
@given(st.lists(st.tuples(st.floats(-1e4, 1e4), st.floats(-1e4, 1e4)), min_size=1, max_size=60))
def test_convex_hull_contains_extremes(pts):
    arr = np.array(pts)
    hull = _convex_hull(arr)
    # Hull vertices are a subset of the input points.
    in_set = {tuple(p) for p in np.unique(arr, axis=0)}
    assert all(tuple(p) in in_set for p in hull)
    # The extreme-x points are always on the hull.
    xs = arr[:, 0]
    assert any(abs(p[0] - xs.max()) < 1e-12 for p in hull)
    assert any(abs(p[0] - xs.min()) < 1e-12 for p in hull)


@settings(max_examples=50, deadline=None)
@given(st.lists(st.integers(-1, 6), min_size=1, max_size=40))
def test_segments_cover_non_negative(seq):
    arr = np.array(seq)
    segs = _segments(arr)
    covered = set()
    for r, s, e in segs:
        assert r >= 0
        assert s <= e
        assert (arr[s : e + 1] == r).all()
        covered |= set(range(s, e + 1))
    assert covered == {i for i, v in enumerate(seq) if v >= 0}


@settings(max_examples=50, deadline=None)
@given(st.lists(st.integers(0, 9), min_size=1, max_size=40))
def test_dedupe_property(xs):
    out = _dedupe(xs)
    assert all(a != b for a, b in zip(out, out[1:]))
    # Same sequence after collapsing runs.
    collapsed = [xs[0]] + [b for a, b in zip(xs, xs[1:]) if a != b]
    assert out == collapsed


@settings(max_examples=60, deadline=None)
@given(
    st.floats(0.01, 100), st.floats(0.01, 1000), st.floats(0.01, 1000), st.floats(1.0, 10_000)
)
def test_modularity_gain_antisymmetric_in_popularity(s_ij, S_i, S_j, S):
    # ΔQ is symmetric in (S_i, S_j) and increasing in s_ij.
    assert modularity_gain(s_ij, S_i, S_j, S) == modularity_gain(s_ij, S_j, S_i, S)
    assert modularity_gain(s_ij + 1, S_i, S_j, S) > modularity_gain(s_ij, S_i, S_j, S)


@settings(max_examples=40, deadline=None)
@given(st.sampled_from(COSTS), st.one_of(st.none(), st.integers(0, 5)))
def test_one_hot_decode_roundtrip_property(master, slave):
    assert _decode(_one_hot((master, slave))) == (master, slave)
