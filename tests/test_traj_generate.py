"""Tests for the trajectory simulator (routes, kinematics, ε-sampling,
noise, sparsification)."""
import numpy as np
import pytest

from repro.traj.generate import CityKinematics, simulate_city_trajectories, simulate_trajectory


def test_routes_are_connected_simple_paths(trajs_small, net_small):
    for tr in trajs_small:
        for a, b in zip(tr.route, tr.route[1:]):
            assert net_small.seg_v[a] == net_small.seg_u[b]
        assert len(set(tr.route.tolist())) == len(tr.route)


def test_points_lie_on_route(trajs_small):
    for tr in trajs_small:
        for s, p in zip(tr.seg, tr.route_pos):
            assert tr.route[p] == s


def test_eps_spacing_exact(trajs_small):
    for tr in trajs_small:
        assert np.allclose(np.diff(tr.t), 15.0)


def test_route_pos_monotone_and_ratio_bounds(trajs_small):
    for tr in trajs_small:
        assert (np.diff(tr.route_pos) >= 0).all()
        assert ((tr.ratio >= 0) & (tr.ratio < 1)).all()


def test_true_coords_match_seg_ratio(trajs_small, net_small):
    tr = trajs_small[0]
    x, y = net_small.point_at(tr.seg, tr.ratio)
    assert np.allclose(x, tr.tx)
    assert np.allclose(y, tr.ty)


def test_noise_magnitude_reasonable(trajs_small):
    errs = np.concatenate([np.hypot(tr.x - tr.tx, tr.y - tr.ty) for tr in trajs_small])
    assert 5.0 < errs.mean() < 30.0  # ~sigma*sqrt(pi/2) with outliers


def test_observed_mask_endpoints(trajs_small):
    for tr in trajs_small:
        assert tr.observed[0] and tr.observed[-1]


def test_deterministic_in_seed(net_small):
    a = simulate_city_trajectories(net_small, 5, eps=15, target_len=2000, speed_mu=8,
                                   noise_sigma=8, seed=9)
    b = simulate_city_trajectories(net_small, 5, eps=15, target_len=2000, speed_mu=8,
                                   noise_sigma=8, seed=9)
    for ta, tb in zip(a, b):
        assert np.array_equal(ta.route, tb.route)
        assert np.allclose(ta.x, tb.x)


def test_progress_has_plateaus_from_stops(net_small):
    """Signalized stops must create near-zero-progress tick intervals."""
    trajs = simulate_city_trajectories(net_small, 20, eps=15, target_len=2500, speed_mu=8,
                                       noise_sigma=5, seed=3)
    stalls = 0
    moved = 0
    for tr in trajs:
        step = np.hypot(np.diff(tr.tx), np.diff(tr.ty))
        stalls += int((step < 1.0).sum())
        moved += len(step)
    assert stalls > 0.02 * moved  # some ticks are spent waiting


def test_kinematics_persistent_and_deterministic(net_small):
    k1 = CityKinematics.for_net(net_small, seed=4)
    k2 = CityKinematics.for_net(net_small, seed=4)
    assert np.allclose(k1.seg_speed_factor, k2.seg_speed_factor)
    assert np.array_equal(k1.node_signal, k2.node_signal)
    k3 = CityKinematics.for_net(net_small, seed=5)
    assert not np.allclose(k1.seg_speed_factor, k3.seg_speed_factor)


def test_slow_segments_accumulate_more_ticks(net_small):
    """Per-segment speed factors must show up in tick-per-metre stats."""
    kin = CityKinematics.for_net(net_small, seed=4, signal_p=0.0)
    trajs = simulate_city_trajectories(net_small, 120, eps=10, target_len=2500, speed_mu=8,
                                       noise_sigma=5, seed=6, kin_seed=4)
    from collections import defaultdict

    ticks = defaultdict(list)
    for tr in trajs:
        vals, cnts = np.unique(tr.seg, return_counts=True)
        for v, c in zip(vals, cnts):
            ticks[int(v)].append(c)
    segs = [s for s, c in ticks.items() if len(c) >= 3]
    tpm = np.array([10 * np.mean(ticks[s]) / net_small.length[s] for s in segs])
    speed = kin.seg_speed_factor[segs]
    # slower segments (low factor) → more time per metre: negative correlation
    corr = np.corrcoef(tpm, speed)[0, 1]
    assert corr < -0.2


def test_min_points_rejection(net_small):
    rng = np.random.default_rng(0)
    tr = simulate_trajectory(net_small, 0, rng, eps=60.0, target_len=300.0, speed_mu=10,
                             noise_sigma=5, gamma=0.1, min_points=50)
    assert tr is None


def test_simulation_failure_raises(net_small):
    with pytest.raises(RuntimeError):
        simulate_city_trajectories(net_small, 5, eps=60.0, target_len=100.0, speed_mu=20,
                                   noise_sigma=5, seed=0)


def test_t0_within_day(trajs_small):
    for tr in trajs_small:
        assert 0 <= tr.t0 < 86400
