"""Tests for the grid spatial index (top-k nearest segment queries)."""
import numpy as np
import pytest

from repro.roadnet.spatial_index import SegmentIndex


def test_topk_matches_brute_force(net_small, index_small):
    rng = np.random.default_rng(0)
    x0, y0, x1, y1 = net_small.bbox()
    all_ids = np.arange(net_small.n_segments)
    for _ in range(100):
        x = rng.uniform(x0 - 50, x1 + 50)
        y = rng.uniform(y0 - 50, y1 + 50)
        ids, d = index_small.query(x, y, 10)
        bf = np.sort(net_small.seg_distances(x, y, all_ids))[:10]
        assert np.allclose(np.sort(d), bf)


def test_query_returns_sorted_distances(index_small):
    _, d = index_small.query(500.0, 300.0, 8)
    assert (np.diff(d) >= -1e-12).all()


def test_query_k_larger_than_n(net_small):
    idx = SegmentIndex(net_small)
    ids, d = idx.query(100.0, 100.0, net_small.n_segments + 50)
    assert len(ids) == net_small.n_segments
    assert len(np.unique(ids)) == len(ids)


def test_nearest_equals_top1(index_small):
    assert index_small.nearest(321.0, 222.0) == int(index_small.query(321.0, 222.0, 1)[0][0])


def test_far_outside_bbox_still_works(net_small, index_small):
    ids, d = index_small.query(-5000.0, -5000.0, 3)
    assert len(ids) == 3
    all_d = net_small.seg_distances(-5000.0, -5000.0, np.arange(net_small.n_segments))
    assert np.allclose(np.sort(d), np.sort(all_d)[:3])


def test_custom_cell_size_same_results(net_small):
    a = SegmentIndex(net_small, cell=40.0)
    b = SegmentIndex(net_small, cell=400.0)
    for x, y in [(100, 100), (700, 450), (0, 0)]:
        ia, da = a.query(x, y, 5)
        ib, db = b.query(x, y, 5)
        assert np.allclose(np.sort(da), np.sort(db))


def test_deterministic(index_small):
    r1 = index_small.query(432.1, 210.9, 10)
    r2 = index_small.query(432.1, 210.9, 10)
    assert np.array_equal(r1[0], r2[0])


def test_on_segment_distance_zero(net_small, index_small):
    x, y = net_small.point_at(5, 0.5)
    ids, d = index_small.query(float(x), float(y), 1)
    assert d[0] < 1e-9
