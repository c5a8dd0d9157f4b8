"""DBSCAN substrate tests, including a brute-force reference check."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.clustering.dbscan import NOISE, dbscan, outlier_mask


def test_empty_input():
    assert dbscan(np.empty((0, 1)), 1.0, 2).tolist() == []


def test_single_point_is_noise_with_minpts_2():
    assert dbscan(np.array([[0.0]]), 1.0, 2).tolist() == [NOISE]


def test_single_point_is_core_with_minpts_1():
    assert dbscan(np.array([[0.0]]), 1.0, 1).tolist() == [0]


def test_two_tight_clusters():
    pts = np.array([[0.0], [0.1], [0.2], [10.0], [10.1], [10.2]])
    labels = dbscan(pts, 0.5, 2)
    assert len(set(labels[:3])) == 1 and len(set(labels[3:])) == 1
    assert labels[0] != labels[3]
    assert NOISE not in labels


def test_outlier_far_from_cluster():
    pts = np.array([[0.0], [1.0], [2.0], [3.0], [4.0], [1e6]])
    labels = dbscan(pts, 1.5, 3)
    assert labels[-1] == NOISE
    assert all(l == labels[0] for l in labels[:-1])


def test_min_pts_includes_self():
    # 3 points pairwise within eps: each has 3 neighbours incl. itself.
    pts = np.array([[0.0], [0.5], [1.0]])
    assert NOISE not in dbscan(pts, 1.0, 3)
    assert set(dbscan(pts, 0.4, 3)) == {NOISE}


def test_border_point_attaches_to_cluster():
    # chain: core core border; border has only 2 neighbours (not core)
    pts = np.array([[0.0], [1.0], [2.0], [3.5]])
    labels = dbscan(pts, 1.1, 3)
    assert labels[2] == labels[1] == labels[0]


def test_2d_euclidean():
    pts = np.array([[0, 0], [0, 1], [1, 0], [50, 50], [50, 51], [51, 50], [200, 200]], dtype=float)
    labels = dbscan(pts, 2.0, 2)
    assert labels[6] == NOISE
    assert len({labels[0], labels[3]}) == 2


def test_1d_array_input_reshaped():
    labels = dbscan(np.array([0.0, 0.1, 9.9]), 0.5, 2)
    assert labels[2] == NOISE


def test_outlier_mask_matches_labels():
    pts = np.array([[0.0], [0.1], [99.0]])
    assert outlier_mask(pts, 1.0, 2).tolist() == [False, False, True]


def test_query4_scenario():
    """The paper's Query 4 parameters: DBSCAN(100000, 5) over per-IP
    byte sums — a dense benign cluster plus one huge exfil value."""
    benign = np.array([80_000.0, 82_000, 85_000, 79_000, 81_500, 83_000, 80_500, 84_000])
    pts = np.append(benign, 50_000_000.0).reshape(-1, 1)
    labels = dbscan(pts, 100_000, 5)
    assert labels[-1] == NOISE
    assert NOISE not in labels[:-1]


def _brute_force(pts, eps, min_pts):
    """Independent reference: compute core points + connected components
    of the core graph, then attach borders."""
    n = len(pts)
    d = np.sqrt(((pts[:, None, :] - pts[None, :, :]) ** 2).sum(-1))
    within = d <= eps
    core = within.sum(1) >= min_pts
    labels = np.full(n, NOISE)
    cid = 0
    for i in range(n):
        if not core[i] or labels[i] != NOISE:
            continue
        stack = [i]
        labels[i] = cid
        while stack:
            j = stack.pop()
            if not core[j]:
                continue
            for k in np.flatnonzero(within[j]):
                if labels[k] == NOISE:
                    labels[k] = cid
                    stack.append(k)
        cid += 1
    return labels


@settings(max_examples=40, deadline=None)
@given(
    st.lists(
        st.tuples(
            st.floats(-100, 100, allow_nan=False),
            st.floats(-100, 100, allow_nan=False),
        ),
        min_size=1,
        max_size=40,
    ),
    st.floats(0.5, 30.0),
    st.integers(1, 6),
)
def test_matches_brute_force(points, eps, min_pts):
    pts = np.array(points, dtype=float)
    got = dbscan(pts, eps, min_pts)
    ref = _brute_force(pts, eps, min_pts)
    # Same noise set, and the same partition of non-noise points
    # (cluster ids may be permuted; border ties may go to either
    # adjacent cluster, so compare noise + core partitions only).
    assert (got == NOISE).tolist() == (ref == NOISE).tolist()
    d = np.sqrt(((pts[:, None, :] - pts[None, :, :]) ** 2).sum(-1))
    core = (d <= eps).sum(1) >= min_pts
    mapping = {}
    for g, r in zip(got[core], ref[core]):
        assert mapping.setdefault(g, r) == r


@pytest.mark.parametrize("min_pts", [1, 2, 5, 10])
def test_all_points_identical(min_pts):
    pts = np.zeros((6, 2))
    labels = dbscan(pts, 0.1, min_pts)
    if min_pts <= 6:
        assert set(labels) == {0}
    else:
        assert set(labels) == {NOISE}
