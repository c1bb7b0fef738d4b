"""Unit tests for the clustering substrate (dendrogram linkage)."""
import numpy as np
import pytest

from repro.substrate.cluster import cluster_order, linkage_average


def test_two_points():
    d = np.array([[0.0, 3.0], [3.0, 0.0]])
    Z = linkage_average(d)
    assert Z.shape == (1, 4)
    assert (Z[0, 0], Z[0, 1]) == (0, 1)
    assert Z[0, 2] == pytest.approx(3.0)
    assert Z[0, 3] == 2


def test_three_points_chain():
    # 0 and 1 are close (d=1); 2 is far (d=10 from 0, 12 from 1).
    d = np.array([[0, 1, 10], [1, 0, 12], [10, 12, 0]], dtype="float64")
    Z = linkage_average(d)
    assert Z.shape == (2, 4)
    # first merge: 0+1 at distance 1
    assert {int(Z[0, 0]), int(Z[0, 1])} == {0, 1}
    assert Z[0, 2] == pytest.approx(1.0)
    # second merge: cluster 3 with leaf 2 at average distance (10+12)/2
    assert {int(Z[1, 0]), int(Z[1, 1])} == {2, 3}
    assert Z[1, 2] == pytest.approx(11.0)
    assert Z[1, 3] == 3


def test_average_linkage_weighting():
    # UPGMA weights by cluster size: after merging {0,1}, distance to 2 is
    # the arithmetic mean of member distances, then {0,1,2} to 3 averages
    # three member distances.
    d = np.array(
        [
            [0, 1, 4, 20],
            [1, 0, 6, 22],
            [4, 6, 0, 30],
            [20, 22, 30, 0],
        ],
        dtype="float64",
    )
    Z = linkage_average(d)
    assert Z[0, 2] == pytest.approx(1.0)       # {0,1}
    assert Z[1, 2] == pytest.approx(5.0)       # {0,1}~2 = (4+6)/2
    assert Z[2, 2] == pytest.approx(24.0)      # {0,1,2}~3 = (20+22+30)/3
    assert Z[2, 3] == 4


def test_monotone_distances_on_ultrametric():
    g = np.random.default_rng(0)
    pts = g.random((8, 2))
    d = np.sqrt(((pts[:, None, :] - pts[None, :, :]) ** 2).sum(-1))
    Z = linkage_average(d)
    # UPGMA on metric data: merge heights are produced in sorted order
    assert Z.shape == (7, 4)
    assert (Z[:, 3] >= 2).all()
    assert Z[-1, 3] == 8


def test_cluster_order_is_permutation():
    g = np.random.default_rng(1)
    pts = g.random((6, 3))
    d = np.sqrt(((pts[:, None, :] - pts[None, :, :]) ** 2).sum(-1))
    Z = linkage_average(d)
    order = cluster_order(Z, 6)
    assert sorted(order) == list(range(6))


def test_cluster_order_groups_close_leaves():
    d = np.array([[0, 1, 10], [1, 0, 12], [10, 12, 0]], dtype="float64")
    Z = linkage_average(d)
    order = cluster_order(Z, 3)
    # leaves 0 and 1 merged first so they must be adjacent in the ordering
    i0, i1 = order.index(0), order.index(1)
    assert abs(i0 - i1) == 1


def test_single_leaf_and_errors():
    assert cluster_order(np.zeros((0, 4)), 1) == [0]
    assert linkage_average(np.zeros((1, 1))).shape == (0, 4)
    with pytest.raises(ValueError):
        linkage_average(np.zeros((2, 3)))
