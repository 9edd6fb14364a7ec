"""Tests for the trajectory-recovery baselines."""
import numpy as np
import pytest

from repro.mma.baselines import HMMMatcher, NearestMatcher
from repro.trmma.baselines import (
    DHTRRecoverer,
    LinearRecoverer,
    MTrajRecRecoverer,
    TERIRecoverer,
    TrajCLDecRecoverer,
    _heading_cos,
    _kalman_smooth,
    snap_with_direction,
)


@pytest.fixture(scope="module")
def one(trajs_small):
    tr = trajs_small[3]
    return tr, np.where(tr.observed)[0]


def _recover(rec, tr, obs):
    return rec.recover(tr.x[obs], tr.y[obs], tr.t[obs], tr.t0, obs, len(tr.t))


def test_linear_recoverer_full_grid(net_small, index_small, pt_norm, one):
    tr, obs = one
    rec = LinearRecoverer(HMMMatcher(net_small, index_small, pt_norm), eps=15.0)
    segs, ratios = _recover(rec, tr, obs)
    assert len(segs) == len(tr.t)
    assert ((ratios >= 0) & (ratios < 1)).all()


def test_linear_with_oracle_matching_is_accurate(net_small, index_small, pt_norm, trajs_small):
    """With true matched segments, linear interpolation should recover a
    large share of ticks (the kinematics keep it from being perfect)."""

    class Oracle:
        net = net_small

        def __init__(self, tr, obs):
            self._segs = tr.seg[obs]

        def match(self, xs, ys, ts, t0):
            return self._segs

    accs = []
    for tr in trajs_small:
        obs = np.where(tr.observed)[0]
        rec = LinearRecoverer(Oracle(tr, obs), eps=15.0)
        segs, _ = _recover(rec, tr, obs)
        accs.append((segs == tr.seg).mean())
    assert 0.3 < np.mean(accs) < 0.95


def test_kalman_smoother_reduces_noise():
    rng = np.random.default_rng(0)
    t = np.arange(50)
    true_x = 3.0 * t
    true_y = 1.5 * t
    px = true_x + rng.normal(0, 8, 50)
    py = true_y + rng.normal(0, 8, 50)
    sx, sy = _kalman_smooth(px, py, dt=1.0)
    raw = np.hypot(px - true_x, py - true_y).mean()
    smooth = np.hypot(sx - true_x, sy - true_y).mean()
    assert smooth < raw


def test_heading_cos_shape_and_range(net_small):
    px = np.array([0.0, 50.0, 100.0])
    py = np.array([0.0, 0.0, 0.0])
    hc = _heading_cos(net_small, px, py)
    assert hc.shape == (3, net_small.n_segments)
    assert (np.abs(hc) <= 1 + 1e-9).all()


def test_snap_with_direction_picks_right_twin(net_small, index_small):
    s = int(np.where(net_small.twin >= 0)[0][0])
    t = int(net_small.twin[s])
    # synthetic eastbound-ish motion along segment s
    x0, y0 = net_small.point_at(s, 0.2)
    x1, y1 = net_small.point_at(s, 0.8)
    px = np.linspace(x0, x1, 5)
    py = np.linspace(y0, y1, 5)
    segs, ratios = snap_with_direction(net_small, index_small, px, py)
    assert (segs == s).sum() > (segs == t).sum()


def test_fitted_recoverers_emit_all_ticks(net_small, index_small, pt_norm, trajs_small, one):
    tr, obs = one

    class MiniCity:
        net = net_small
        index = index_small
        norm = pt_norm
        eps = 15.0
        gamma = 0.1
        name = "pt"

        def trajs(self, split):
            return trajs_small[:6]

    city = MiniCity()
    for cls in (MTrajRecRecoverer, TrajCLDecRecoverer, DHTRRecoverer, TERIRecoverer):
        rec = cls(net_small, index_small, pt_norm, 15.0, d=12, seed=0).fit(city, epochs=1)
        segs, ratios = _recover(rec, tr, obs)
        assert len(segs) == len(tr.t)
        assert ((segs >= 0) & (segs < net_small.n_segments)).all()
        assert ((ratios >= 0) & (ratios <= 1)).all()


def test_recoverers_pickle(net_small, index_small, pt_norm):
    import pickle

    rec = LinearRecoverer(NearestMatcher(net_small, index_small, pt_norm), eps=15.0)
    clone = pickle.loads(pickle.dumps(rec))
    assert clone.name == "Linear"
