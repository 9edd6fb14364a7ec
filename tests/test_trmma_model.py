"""Tests for the TRMMA DualFormer + decoder model (§V)."""
import pickle

import numpy as np
import pytest

from repro.nn.optim import Adam
from repro.trmma.features import build_infer_sample, build_train_sample
from repro.trmma.model import TRMMAModel


@pytest.fixture(scope="module")
def sample(net_small, trajs_small, pt_norm):
    return build_train_sample(net_small, trajs_small[0], pt_norm)


@pytest.fixture(scope="module")
def model(net_small):
    return TRMMAModel(net_small.n_segments, d_h=16, n_layers=1, seed=0)


def test_encode_shape(model, sample):
    H = model.encode(sample)
    assert H.shape == (len(sample.route), model.d_h)


def test_df_ablation_ignores_trajectory(net_small, sample):
    m = TRMMAModel(net_small.n_segments, d_h=16, n_layers=1, seed=0, use_dualformer=False)
    H1 = m.encode(sample).data
    import copy

    s2 = copy.deepcopy(sample)
    s2.obs_feats = s2.obs_feats + 0.1
    assert np.allclose(m.encode(s2).data, H1)  # H = R only
    mf = TRMMAModel(net_small.n_segments, d_h=16, n_layers=1, seed=0, use_dualformer=True)
    assert not np.allclose(mf.encode(s2).data, mf.encode(sample).data)


def test_expected_offsets_match_observed_anchors(sample):
    exp = TRMMAModel.expected_offsets(sample)
    assert len(exp) == sample.n_ticks
    start = sample.route_feats[:, 1]
    ln = sample.route_feats[:, 0]
    for j, tick in enumerate(sample.obs_tick):
        off = start[sample.obs_pos[j]] + sample.obs_feats[j, 4] * ln[sample.obs_pos[j]]
        assert exp[tick] == pytest.approx(off, abs=1e-9)
    assert (np.diff(exp) >= -1e-9).all()  # monotone along the route


def test_loss_finite_and_counts_missing(model, sample):
    l, n = model.loss(sample)
    assert np.isfinite(l.item())
    assert n == sample.n_ticks - len(sample.obs_tick)


def test_loss_decreases_on_overfit(net_small, sample):
    m = TRMMAModel(net_small.n_segments, d_h=16, n_layers=1, seed=2)
    opt = Adam(m.parameters(), lr=3e-3)
    first = m.loss(sample)[0].item()
    for _ in range(25):
        opt.zero_grad()
        l, _ = m.loss(sample)
        l.backward()
        opt.step()
    assert m.loss(sample)[0].item() < first


def test_recover_shapes_and_constraints(model, sample):
    segs, ratios = model.recover(sample)
    assert len(segs) == sample.n_ticks
    assert ((ratios >= 0) & (ratios < 1)).all()
    route = sample.route.tolist()
    pos = [route.index(s) for s in segs]
    assert (np.diff(pos) >= 0).all()  # Eq. (17) order constraint


def test_recover_pins_observed_points(model, sample):
    segs, ratios = model.recover(sample)
    for j, tick in enumerate(sample.obs_tick):
        assert segs[tick] == sample.route[sample.obs_pos[j]]
        assert ratios[tick] == pytest.approx(sample.obs_feats[j, 4])


def test_recover_on_infer_sample(net_small, trajs_small, pt_norm, model):
    tr = trajs_small[1]
    obs = np.where(tr.observed)[0]
    s = build_infer_sample(net_small, pt_norm, tr.x[obs], tr.y[obs], tr.t[obs], tr.t0,
                           obs, len(tr.t), 15.0, tr.seg[obs], tr.ratio[obs], tr.route)
    segs, ratios = model.recover(s)
    assert set(segs.tolist()) <= set(tr.route.tolist())


def test_model_pickles(model, sample):
    clone = pickle.loads(pickle.dumps(model))
    a, _ = clone.recover(sample)
    b, _ = model.recover(sample)
    assert np.array_equal(a, b)


def test_decode_feats_mark_containing_segment(sample):
    exp = TRMMAModel.expected_offsets(sample)
    tick = int(sample.n_ticks // 2)
    feats = TRMMAModel._decode_feats(sample, float(sample.tick_tau[tick]), float(exp[tick]))
    inside = np.where(feats[:, 2] > 0)[0]
    assert len(inside) >= 1  # some segment contains the expected offset
    k = inside[0]
    assert 0 <= feats[k, 0] < 1
