"""Trajectory-recovery baselines (Table III competitors), lite
re-implementations on this repo's substrates — DESIGN.md §3 documents the
faithfulness notes per method.

All recoverers implement the common interface used by
:func:`repro.trmma.infer.run_recovery`::

    recover(xs, ys, ts, t0, idxs, n_ticks) -> (segs, ratios)  # per ε tick

Three families:

* **Linear** — FMM map matching + route + linear (time→distance)
  interpolation; the non-learned benchmark.
* **All-segment seq2seq decoders** (MTrajRec / RNTrajRec / MM-STGED and the
  representation-learning trio TrajGAT/TrajCL/ST2Vec + Dec): an encoder
  over the observed points and a GRU decoder that classifies each ε tick
  over *all n segments* of the network — the paper's efficiency foil — and
  regresses the ratio. The encoders differ per method; the representation-
  learning trio compresses the trajectory to a single vector first (their
  information bottleneck).
* **Free-space methods** (DHTR / TERI): predict per-tick coordinates
  without road constraints (DHTR: BiGRU + constant-velocity Kalman
  smoothing; TERI: time-aware attention interpolation), then snap to the
  nearest segment.
"""
from __future__ import annotations

import numpy as np

from repro.mma.baselines import HMMMatcher, segment_feature_matrix
from repro.mma.features import point_features
from repro.nn.autodiff import Tensor, concat, stack
from repro.nn.gru import BiGRU, GRU, GRUCell
from repro.nn.layers import Linear, MLP, Module
from repro.nn.optim import Adam
from repro.nn.transformer import TransformerEncoder
from repro.roadnet.node2vec import node2vec_embeddings
from repro.roadnet.routing import stitch_route
from repro.roadnet.spatial_index import SegmentIndex
from repro.traj.datasets import CityData
from repro.traj.ops import locate_on_route, route_cum_lengths, route_offset


# ---------------------------------------------------------------------------
# Linear
# ---------------------------------------------------------------------------
class LinearRecoverer:
    """FMM + linear interpolation along the matched route (non-learned)."""

    name = "Linear"

    def __init__(self, matcher, eps: float, costs=None):
        self.matcher = matcher  # typically HMMMatcher (FMM), holds net
        self.eps = eps
        self.costs = costs

    def recover(self, xs, ys, ts, t0, idxs, n_ticks):
        net = self.matcher.net
        segs_m = self.matcher.match(xs, ys, ts, t0)
        route = stitch_route(net, [int(s) for s in segs_m], self.costs)
        cum = route_cum_lengths(net, route)
        # offsets of observed points along the route (monotone projection)
        from repro.trmma.features import positions_in_route

        pos = positions_in_route(np.asarray(route), segs_m)
        offs = []
        for i, (s, k) in enumerate(zip(segs_m, pos)):
            r, _ = net.project(float(xs[i]), float(ys[i]), int(route[k]))
            offs.append(route_offset(net, route, int(k), r, cum))
        offs = np.maximum.accumulate(np.array(offs))
        tick_off = np.interp(np.arange(n_ticks), idxs.astype(float), offs)
        segs = np.zeros(n_ticks, dtype=np.int64)
        ratios = np.zeros(n_ticks)
        for j, d in enumerate(tick_off):
            _, sg, rr = locate_on_route(net, route, float(d), cum)
            segs[j], ratios[j] = sg, rr
        return segs, ratios


from repro.mma.baselines import heading_cos as _heading_cos  # noqa: E402


def snap_with_direction(net, index, px, py, k: int = 6, w_dir: float = 30.0):
    """Snap coordinate estimates to segments, scoring candidates by
    perpendicular distance minus a heading bonus (twin disambiguation)."""
    n = len(px)
    segs = np.zeros(n, dtype=np.int64)
    ratios = np.zeros(n)
    for i in range(n):
        ids, d = index.query(float(px[i]), float(py[i]), k)
        a = max(0, i - 1)
        b = min(n - 1, i + 1)
        mx, my = px[b] - px[a], py[b] - py[a]
        nrm = float(np.hypot(mx, my))
        score = d.copy()
        if nrm > 1e-6:
            dirs = net.seg_dir(ids)
            score = score - w_dir * (dirs[:, 0] * mx + dirs[:, 1] * my) / nrm
        sg = int(ids[int(np.argmin(score))])
        segs[i] = sg
        ratios[i], _ = net.project(float(px[i]), float(py[i]), sg)
    return segs, ratios


# ---------------------------------------------------------------------------
# All-segment seq2seq decoders
# ---------------------------------------------------------------------------
class _FullVocabDecoder(Module):
    """GRU decoder classifying every ε tick over all n segments.

    Segment scores are ``q · proj(seg_features)`` (see
    :func:`repro.mma.baselines.segment_feature_matrix`); the ratio head is
    an MLP over the state and the predicted segment's projection.
    """

    def __init__(self, seg_feats: np.ndarray, d: int, rng: np.random.Generator):
        self.seg_feats = seg_feats
        self.d = d
        self.proj = MLP([seg_feats.shape[1], 64, d], rng)
        self.bias = Linear(seg_feats.shape[1], 1, rng)
        self.gru = GRUCell(d + 2, d, rng)
        self.q = Linear(2 * d, d, rng)  # state+attn-ctx → query
        self.reg = MLP([2 * d, d, 1], rng)
        # learned-score gain, initialised small so the constraint prior
        # dominates until the learned scores become informative
        self.gain = Tensor(np.array([0.3]), requires_grad=True)

    def step(self, E: Tensor, b: Tensor, h: Tensor, ctx: Tensor, penalty: np.ndarray | None = None):
        """One tick: returns (logits over n segments, query state).

        ``penalty`` is MTrajRec's road-constraint layer expressed as a soft
        locality prior around the time-interpolated position (the original
        masks candidates to the region around the interpolated point)."""
        hc = concat([h, ctx], axis=-1)
        q = self.q(hc)  # (d,)
        logits = (E @ q) * self.gain + b
        if penalty is not None:
            logits = logits + Tensor(penalty)
        return logits, hc

    def ratio(self, hc: Tensor, e_k: Tensor) -> Tensor:
        return self.reg(concat([self.q(hc), e_k], axis=-1)).sigmoid()

    def advance(self, h: Tensor, e_prev: Tensor, r_prev: float, tau: float) -> Tensor:
        inp = concat([e_prev, Tensor(np.array([r_prev, tau]))], axis=-1)
        return self.gru(inp, h)


class _Seq2SegRecoverer:
    """Shared skeleton of the all-segment seq2seq recovery baselines.

    Subclasses define ``_encode(X, xs, ys) -> (enc_states (m, d), h0)``
    where ``m`` may be 1 for pooled (representation-learning) encoders.
    """

    name = "Seq2Seg"
    use_step_attention = True

    def __init__(self, net, index: SegmentIndex, norm: dict, eps: float, d: int = 32, seed: int = 0):
        self.net, self.index, self.norm, self.eps, self.d = net, index, norm, eps, d
        rng = np.random.default_rng(seed)
        self.seg_feats = segment_feature_matrix(net, norm, seed=seed)
        self.dec = _FullVocabDecoder(self.seg_feats, d, rng)
        self.inp = Linear(4, d, rng)
        self._build_encoder(rng)

    # -- subclass hooks ----------------------------------------------------
    def _build_encoder(self, rng):
        self.enc = GRU(self.d, self.d, rng)

    def _encode(self, X: np.ndarray, xs, ys):
        states = self.enc(self.inp(Tensor(X)))
        return states, states.mean(axis=0)

    def _modules(self) -> list[Module]:
        mods = [self.dec, self.inp]
        for attr in ("enc", "enc2", "pool"):
            if hasattr(self, attr):
                mods.append(getattr(self, attr))
        return mods

    def parameters(self):
        out = []
        for m in self._modules():
            out.extend(m.parameters())
        return out

    # -- shared machinery --------------------------------------------------
    def _obs_X(self, xs, ys, ts, t0, n_ticks):
        pf = point_features(np.asarray(xs), np.asarray(ys), np.asarray(ts), t0, self.norm)
        tau = (np.asarray(ts) / max((n_ticks - 1) * self.eps, 1e-9))[:, None]
        return np.concatenate([pf, tau], axis=1)

    def _ctx(self, enc_states: Tensor, h: Tensor) -> Tensor:
        if not self.use_step_attention or enc_states.shape[0] == 1:
            return enc_states.mean(axis=0)
        a = (enc_states @ h).softmax(axis=-1)
        return a @ enc_states

    def _rollout(self, xs, ys, ts, t0, idxs, n_ticks, teacher=None, lam: float = 2.0):
        """Run the decoder over all ticks.

        With ``teacher=(gt_seg, gt_ratio)`` returns the training loss
        tensor; otherwise returns predicted ``(segs, ratios)``.
        """
        X = self._obs_X(xs, ys, ts, t0, n_ticks)
        enc_states, h = self._encode(X, xs, ys)
        E = self.dec.proj(Tensor(self.seg_feats))  # (n, d)
        b = self.dec.bias(Tensor(self.seg_feats)).reshape(len(self.seg_feats))
        taus = (np.arange(n_ticks) * self.eps) / max((n_ticks - 1) * self.eps, 1e-9)
        # MTrajRec-style constraint region around the time-interpolated
        # position of each tick (soft penalty; see _FullVocabDecoder.step),
        # plus a heading prior from the interpolated motion direction (the
        # originals carry heading in their road-aware features)
        bx = np.interp(np.arange(n_ticks), np.asarray(idxs, dtype=float), np.asarray(xs))
        by = np.interp(np.arange(n_ticks), np.asarray(idxs, dtype=float), np.asarray(ys))
        from repro.mma.baselines import distance_penalty

        pen = distance_penalty(self.net, bx, by, delta=150.0)
        pen = pen + 4.0 * _heading_cos(self.net, bx, by)
        losses = []
        segs = np.zeros(n_ticks, dtype=np.int64)
        ratios = np.zeros(n_ticks)
        for tick in range(n_ticks):
            ctx = self._ctx(enc_states, h)
            logits, hc = self.dec.step(E, b, h, ctx, pen[tick])
            if teacher is not None:
                gt_k = int(teacher[0][tick])
                lp = logits.log_softmax(axis=-1)
                ce = -lp[gt_k]
                rhat = self.dec.ratio(hc, E[gt_k])
                diff = rhat - Tensor(np.array([teacher[1][tick]]))
                mae = (diff.relu() + (-diff).relu()).reshape(())
                losses.append(ce + mae * lam)
                k = gt_k
                r = float(teacher[1][tick])
            else:
                k = int(np.argmax(logits.data))
                r = float(self.dec.ratio(hc, E[k]).data[0])
                segs[tick] = k
                ratios[tick] = r
            h = self.dec.advance(h, E[k], r, float(taus[tick]))
        if teacher is not None:
            total = losses[0]
            for l in losses[1:]:
                total = total + l
            return total * (1.0 / n_ticks)
        return segs, ratios

    # -- public API --------------------------------------------------------
    def fit(self, city: CityData, epochs: int = 4, lr: float = 2e-3, batch: int = 4, seed: int = 0,
            verbose: bool = False):
        data = []
        for tr in city.trajs("train"):
            obs = np.where(tr.observed)[0]
            if len(obs) < 2:
                continue
            data.append((tr.x[obs], tr.y[obs], tr.t[obs], tr.t0, obs, len(tr.t), tr.seg, tr.ratio))
        opt = Adam(self.parameters(), lr=lr)
        rng = np.random.default_rng(seed)
        for ep in range(epochs):
            order = rng.permutation(len(data))
            for lo in range(0, len(order), batch):
                opt.zero_grad()
                chunk = order[lo : lo + batch]
                losses = [
                    self._rollout(d[0], d[1], d[2], d[3], d[4], d[5], teacher=(d[6], d[7]))
                    for d in (data[i] for i in chunk)
                ]
                loss = losses[0]
                for l in losses[1:]:
                    loss = loss + l
                (loss * (1.0 / len(losses))).backward()
                opt.step()
            if verbose:
                print(f"[{self.name}:{city.name}] epoch {ep + 1}/{epochs}")
        return self

    def recover(self, xs, ys, ts, t0, idxs, n_ticks):
        return self._rollout(xs, ys, ts, t0, idxs, n_ticks)


class MTrajRecRecoverer(_Seq2SegRecoverer):
    """MTrajRec-lite: GRU encoder, attention, all-segment GRU decoder."""

    name = "MTrajRec"


class RNTrajRecRecoverer(_Seq2SegRecoverer):
    """RNTrajRec-lite: transformer encoder over points enriched with the
    mean Node2Vec embedding of each point's candidate subgraph (the
    GNN-over-surrounding-subgraph surrogate)."""

    name = "RNTrajRec"

    def __init__(self, net, index, norm, eps, d: int = 32, seed: int = 0, k_c: int = 5):
        self.k_c = k_c
        self.n2v = node2vec_embeddings(net, d=16, seed=seed)
        super().__init__(net, index, norm, eps, d, seed)

    def _build_encoder(self, rng):
        self.inp = Linear(4 + 16, self.d, rng)
        self.enc = TransformerEncoder(self.d, n_layers=2, n_heads=2, rng=rng)

    def _encode(self, X, xs, ys):
        sub = np.zeros((len(X), 16))
        for i in range(len(X)):
            ids, _ = self.index.query(float(xs[i]), float(ys[i]), self.k_c)
            if len(ids):
                sub[i] = self.n2v[ids].mean(axis=0)
        states = self.enc(self.inp(Tensor(np.concatenate([X, sub], axis=1))))
        return states, states.mean(axis=0)


class MMSTGEDRecoverer(RNTrajRecRecoverer):
    """MM-STGED-lite: micro/macro graph features — candidate-subgraph mean
    (micro) + trajectory-level aggregates appended to the state (macro) —
    over a GRU encoder."""

    name = "MM-STGED"

    def _build_encoder(self, rng):
        self.inp = Linear(4 + 16 + 4, self.d, rng)
        self.enc = GRU(self.d, self.d, rng)

    def _encode(self, X, xs, ys):
        sub = np.zeros((len(X), 16))
        for i in range(len(X)):
            ids, _ = self.index.query(float(xs[i]), float(ys[i]), self.k_c)
            if len(ids):
                sub[i] = self.n2v[ids].mean(axis=0)
        xs = np.asarray(xs)
        ys = np.asarray(ys)
        span = max(self.norm["x1"] - self.norm["x0"], 1e-9)
        macro = np.array(
            [
                (xs[-1] - xs[0]) / span,
                (ys[-1] - ys[0]) / span,
                np.hypot(np.diff(xs), np.diff(ys)).sum() / span,
                len(xs) / 50.0,
            ]
        )
        feats = np.concatenate([X, sub, np.broadcast_to(macro, (len(X), 4))], axis=1)
        states = self.enc(self.inp(Tensor(feats)))
        return states, states.mean(axis=0)


class _PooledRecoverer(_Seq2SegRecoverer):
    """Base for the representation-learning trio: the encoder collapses the
    trajectory into ONE embedding that conditions the decoder (no per-step
    attention over points) — the bottleneck that costs them accuracy."""

    use_step_attention = False

    def _encode(self, X, xs, ys):
        pooled = self._pool(X, xs, ys).reshape(1, self.d)
        return pooled, pooled.reshape(self.d)

    def _pool(self, X, xs, ys) -> Tensor:
        raise NotImplementedError


class TrajGATDecRecoverer(_PooledRecoverer):
    """TrajGAT+Dec-lite: graph-attention pooling over the candidate-segment
    embeddings of the trajectory's points."""

    name = "TrajGAT+Dec"

    def __init__(self, net, index, norm, eps, d: int = 32, seed: int = 0, k_c: int = 5):
        self.k_c = k_c
        self.n2v = node2vec_embeddings(net, d=16, seed=seed)
        super().__init__(net, index, norm, eps, d, seed)

    def _build_encoder(self, rng):
        self.enc = Linear(16, self.d, rng)  # candidate-embedding projector
        self.pool = MLP([self.d, self.d, 1], rng)  # attention scorer

    def _pool(self, X, xs, ys):
        embs = []
        for i in range(len(X)):
            ids, _ = self.index.query(float(xs[i]), float(ys[i]), self.k_c)
            embs.append(self.n2v[ids].mean(axis=0) if len(ids) else np.zeros(16))
        z = self.enc(Tensor(np.array(embs)))  # (ℓ, d)
        a = self.pool(z).reshape(len(embs)).softmax(axis=-1)
        return a @ z


class TrajCLDecRecoverer(_PooledRecoverer):
    """TrajCL+Dec-lite: dual-feature (structural mean-point ⊕ spatial
    displacement histogram) MLP pooling."""

    name = "TrajCL+Dec"

    def _build_encoder(self, rng):
        self.enc = MLP([4 + 4, self.d, self.d], rng)

    def _pool(self, X, xs, ys):
        xs = np.asarray(xs)
        ys = np.asarray(ys)
        span = max(self.norm["x1"] - self.norm["x0"], 1e-9)
        disp = np.array(
            [
                (xs[-1] - xs[0]) / span,
                (ys[-1] - ys[0]) / span,
                np.abs(np.diff(xs)).sum() / span,
                np.abs(np.diff(ys)).sum() / span,
            ]
        )
        feat = np.concatenate([X.mean(axis=0), disp])
        return self.enc(Tensor(feat))


class ST2VecDecRecoverer(_PooledRecoverer):
    """ST2Vec+Dec-lite: separate spatial and temporal poolings fused."""

    name = "ST2Vec+Dec"

    def _build_encoder(self, rng):
        self.enc = MLP([2, self.d, self.d // 2], rng)  # spatial
        self.enc2 = MLP([2, self.d, self.d - self.d // 2], rng)  # temporal

    def _pool(self, X, xs, ys):
        sp = self.enc(Tensor(X[:, :2].mean(axis=0)))
        tm = self.enc2(Tensor(np.array([X[:, 2].mean(), X[:, 3].mean()])))
        return concat([sp, tm], axis=-1)


# ---------------------------------------------------------------------------
# Free-space methods
# ---------------------------------------------------------------------------
def _kalman_smooth(px: np.ndarray, py: np.ndarray, dt: float, q: float = 0.5, r: float = 25.0):
    """Constant-velocity Kalman filter + RTS smoother over 2-D positions
    (DHTR's calibration component). ``q``/``r`` are process/measurement
    noise scales in metres."""
    n = len(px)
    A = np.array([[1, 0, dt, 0], [0, 1, 0, dt], [0, 0, 1, 0], [0, 0, 0, 1]])
    Hm = np.array([[1.0, 0, 0, 0], [0, 1.0, 0, 0]])
    Q = q * np.eye(4)
    R = r * np.eye(2)
    xs_f = np.zeros((n, 4))
    Ps_f = np.zeros((n, 4, 4))
    xs_p = np.zeros((n, 4))
    Ps_p = np.zeros((n, 4, 4))
    x = np.array([px[0], py[0], 0, 0])
    P = 10 * np.eye(4)
    for i in range(n):
        if i:
            x = A @ x
            P = A @ P @ A.T + Q
        xs_p[i] = x
        Ps_p[i] = P
        z = np.array([px[i], py[i]])
        S = Hm @ P @ Hm.T + R
        K = P @ Hm.T @ np.linalg.inv(S)
        x = x + K @ (z - Hm @ x)
        P = (np.eye(4) - K @ Hm) @ P
        xs_f[i] = x
        Ps_f[i] = P
    xs_s = xs_f.copy()
    for i in range(n - 2, -1, -1):
        C = Ps_f[i] @ A.T @ np.linalg.inv(Ps_p[i + 1])
        xs_s[i] = xs_f[i] + C @ (xs_s[i + 1] - xs_p[i + 1])
    return xs_s[:, 0], xs_s[:, 1]


class _FreeSpaceRecoverer:
    """Base: predict per-tick coordinates, then snap to nearest segment."""

    name = "FreeSpace"

    def __init__(self, net, index, norm, eps, d: int = 32, seed: int = 0):
        self.net, self.index, self.norm, self.eps, self.d = net, index, norm, eps, d
        self._build(np.random.default_rng(seed))

    def _build(self, rng):
        raise NotImplementedError

    def parameters(self):
        out = []
        for attr in ("inp", "enc", "head"):
            if hasattr(self, attr):
                out.extend(getattr(self, attr).parameters())
        return out

    def _coords(self, xs, ys, ts, t0, idxs, n_ticks) -> Tensor:
        raise NotImplementedError

    def fit(self, city: CityData, epochs: int = 4, lr: float = 2e-3, batch: int = 4, seed: int = 0,
            verbose: bool = False):
        span = max(self.norm["x1"] - self.norm["x0"], 1e-9)
        data = []
        for tr in city.trajs("train"):
            obs = np.where(tr.observed)[0]
            if len(obs) < 2:
                continue
            data.append((tr.x[obs], tr.y[obs], tr.t[obs], tr.t0, obs, len(tr.t), tr.tx, tr.ty))
        opt = Adam(self.parameters(), lr=lr)
        rng = np.random.default_rng(seed)
        for ep in range(epochs):
            order = rng.permutation(len(data))
            for lo in range(0, len(order), batch):
                opt.zero_grad()
                losses = []
                for i in order[lo : lo + batch]:
                    d = data[i]
                    pred = self._coords(d[0], d[1], d[2], d[3], d[4], d[5])
                    target = Tensor(np.stack([d[6], d[7]], axis=1) / span)
                    losses.append(((pred * (1.0 / span) - target) ** 2).mean())
                loss = losses[0]
                for l in losses[1:]:
                    loss = loss + l
                (loss * (1.0 / len(losses))).backward()
                opt.step()
            if verbose:
                print(f"[{self.name}:{city.name}] epoch {ep + 1}/{epochs}")
        return self

    def recover(self, xs, ys, ts, t0, idxs, n_ticks):
        coords = self._coords(xs, ys, ts, t0, idxs, n_ticks).data
        px, py = self._post(coords[:, 0], coords[:, 1])
        return snap_with_direction(self.net, self.index, px, py)

    def _post(self, px, py):
        return px, py


class DHTRRecoverer(_FreeSpaceRecoverer):
    """DHTR-lite: BiGRU over observed points → per-tick coordinate
    residual on top of time-linear interpolation, Kalman-smoothed."""

    name = "DHTR"

    def _build(self, rng):
        self.inp = Linear(4, self.d, rng)
        self.enc = BiGRU(self.d, self.d // 2, rng)
        self.head = MLP([self.d + 1, self.d, 2], rng)

    def _coords(self, xs, ys, ts, t0, idxs, n_ticks) -> Tensor:
        from repro.mma.features import point_features

        X = point_features(np.asarray(xs), np.asarray(ys), np.asarray(ts), t0, self.norm)
        tau_obs = (np.asarray(ts) / max((n_ticks - 1) * self.eps, 1e-9))[:, None]
        states = self.enc(self.inp(Tensor(np.concatenate([X, tau_obs], axis=1))))  # (ℓ, d)
        base_x = np.interp(np.arange(n_ticks), idxs.astype(float), np.asarray(xs))
        base_y = np.interp(np.arange(n_ticks), idxs.astype(float), np.asarray(ys))
        pooled = states.mean(axis=0)
        taus = (np.arange(n_ticks) / max(n_ticks - 1, 1))[:, None]
        pe = pooled.reshape(1, self.d) + Tensor(np.zeros((n_ticks, 1)))
        res = self.head(concat([pe, Tensor(taus)], axis=-1))  # (ℓ_ε, 2)
        scale = 0.02 * max(self.norm["x1"] - self.norm["x0"], 1.0)
        return Tensor(np.stack([base_x, base_y], axis=1)) + res * scale

    def _post(self, px, py):
        return _kalman_smooth(px, py, self.eps)


class TERIRecoverer(_FreeSpaceRecoverer):
    """TERI-lite: transformer over observed points; per-tick coordinates
    from time-difference attention over the observed points (+ residual)."""

    name = "TERI"

    def _build(self, rng):
        self.inp = Linear(4, self.d, rng)
        self.enc = TransformerEncoder(self.d, n_layers=2, n_heads=2, rng=rng)
        self.head = MLP([self.d + 1, self.d, 2], rng)

    def _coords(self, xs, ys, ts, t0, idxs, n_ticks) -> Tensor:
        from repro.mma.features import point_features

        xs = np.asarray(xs)
        ys = np.asarray(ys)
        X = point_features(xs, ys, np.asarray(ts), t0, self.norm)
        tau_obs = (np.asarray(ts) / max((n_ticks - 1) * self.eps, 1e-9))[:, None]
        states = self.enc(self.inp(Tensor(np.concatenate([X, tau_obs], axis=1))))
        # time-difference attention: each tick attends to observed points
        # with weights softmax(-|Δt|/ε̄)
        dt = np.abs(np.arange(n_ticks)[:, None] - idxs[None, :].astype(float))
        W = np.exp(-dt / 2.0)
        W = W / W.sum(axis=1, keepdims=True)
        base = W @ np.stack([xs, ys], axis=1)  # (ℓ_ε, 2)
        ctx = Tensor(W) @ states  # (ℓ_ε, d)
        taus = (np.arange(n_ticks) / max(n_ticks - 1, 1))[:, None]
        res = self.head(concat([ctx, Tensor(taus)], axis=-1))
        scale = 0.02 * max(self.norm["x1"] - self.norm["x0"], 1.0)
        return Tensor(base) + res * scale
