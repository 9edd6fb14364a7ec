"""Tests for TRMMA sample builders and route geometry features."""
import numpy as np
import pytest

from repro.trmma.features import (
    build_infer_sample,
    build_train_sample,
    positions_in_route,
    route_geometry,
    route_time_weights,
)


@pytest.fixture(scope="module")
def tsample(net_small, trajs_small, pt_norm):
    return build_train_sample(net_small, trajs_small[0], pt_norm)


def test_train_sample_fields(tsample, trajs_small):
    tr = trajs_small[0]
    obs = np.where(tr.observed)[0]
    assert tsample.obs_feats.shape == (len(obs), 5)
    assert tsample.n_ticks == len(tr.t)
    assert np.array_equal(tsample.obs_tick, obs)
    assert np.array_equal(tsample.tick_pos, tr.route_pos)
    assert (tsample.tick_ratio >= 0).all() and (tsample.tick_ratio < 1).all()


def test_train_sample_obs_ratio_is_noisy_projection(net_small, trajs_small, pt_norm, tsample):
    tr = trajs_small[0]
    obs = np.where(tr.observed)[0]
    i = obs[0]
    r, _ = net_small.project(float(tr.x[i]), float(tr.y[i]), int(tr.seg[i]))
    assert tsample.obs_feats[0, 4] == pytest.approx(r)


def test_train_sample_rejects_degenerate(net_small, trajs_small, pt_norm):
    tr = trajs_small[0]
    import copy

    t2 = copy.deepcopy(tr)
    t2.observed = np.zeros_like(t2.observed)
    t2.observed[0] = True
    assert build_train_sample(net_small, t2, pt_norm) is None


def test_route_geometry_sums_to_one(net_small, trajs_small):
    g = route_geometry(net_small, trajs_small[0].route)
    assert g[:, 0].sum() == pytest.approx(1.0)
    assert g[0, 1] == 0.0
    assert np.allclose(g[1:, 1], np.cumsum(g[:-1, 0]))


def test_route_time_weights_uniform_fallback(net_small, trajs_small):
    route = trajs_small[0].route
    w = route_time_weights(net_small, route, None)
    assert w.sum() == pytest.approx(1.0)
    expect = net_small.length[route] / net_small.length[route].sum()
    assert np.allclose(w, expect)


def test_route_time_weights_respects_stats(net_small, trajs_small):
    route = trajs_small[0].route
    tpm = np.ones(net_small.n_segments)
    tpm[route[0]] = 10.0  # first segment is 10x slower
    w = route_time_weights(net_small, route, tpm)
    wu = route_time_weights(net_small, route, None)
    assert w[0] > wu[0] * 3


def test_positions_in_route_monotone():
    route = np.array([5, 6, 7, 8, 7])
    pos = positions_in_route(route, np.array([5, 7, 8]))
    assert pos.tolist() == [0, 2, 3]
    # monotone even when a later match appears earlier in the route
    pos2 = positions_in_route(route, np.array([8, 7]))
    assert pos2.tolist() == [3, 4]


def test_positions_in_route_missing_falls_back():
    route = np.array([1, 2, 3])
    pos = positions_in_route(route, np.array([2, 99]))
    assert pos[0] == 1
    assert pos[1] == 1  # fallback to previous


def test_infer_sample_alignment(net_small, trajs_small, pt_norm):
    tr = trajs_small[0]
    obs = np.where(tr.observed)[0]
    s = build_infer_sample(
        net_small, pt_norm, tr.x[obs], tr.y[obs], tr.t[obs], tr.t0, obs, len(tr.t), 15.0,
        tr.seg[obs], tr.ratio[obs], tr.route,
    )
    assert s.n_ticks == len(tr.t)
    assert (s.tick_pos == -1).all()
    assert np.array_equal(s.obs_pos, tr.route_pos[obs])
    assert s.tick_tau[-1] == pytest.approx(1.0)
