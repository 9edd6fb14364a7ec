"""Node2Vec-lite: segment embeddings via random-walk skip-gram with
negative sampling (SGNS), in numpy.

The paper pre-learns ``W_G ∈ R^{n × d0}`` with Node2Vec [43] over the road
network and uses it to initialise the candidate-segment embedding layer
(Eq. (1)). We walk the *segment* graph (successor relation), collect
(center, context) pairs within a window, and train SGNS with vectorised
minibatches — the same objective at toy scale, minus Node2Vec's p/q biased
walk (uniform walks suffice for grid-like cities).
"""
from __future__ import annotations

import numpy as np

from repro.roadnet.graph import RoadNetwork


def _walks(net: RoadNetwork, n_walks: int, walk_len: int, rng: np.random.Generator) -> np.ndarray:
    n = net.n_segments
    walks = np.empty((n * n_walks, walk_len), dtype=np.int64)
    row = 0
    for _ in range(n_walks):
        for s in range(n):
            cur = s
            walks[row, 0] = cur
            for t in range(1, walk_len):
                succ = net.successors(cur)
                cur = int(succ[rng.integers(len(succ))]) if len(succ) else cur
                walks[row, t] = cur
            row += 1
    return walks


def node2vec_embeddings(
    net: RoadNetwork,
    d: int = 32,
    n_walks: int = 6,
    walk_len: int = 12,
    window: int = 2,
    epochs: int = 2,
    n_neg: int = 4,
    lr: float = 0.05,
    seed: int = 0,
) -> np.ndarray:
    """Train SGNS segment embeddings; returns ``(n, d)`` float64 array."""
    rng = np.random.default_rng(seed)
    n = net.n_segments
    walks = _walks(net, n_walks, walk_len, rng)

    centers, contexts = [], []
    for w in range(1, window + 1):
        centers.append(walks[:, :-w].ravel())
        contexts.append(walks[:, w:].ravel())
        centers.append(walks[:, w:].ravel())
        contexts.append(walks[:, :-w].ravel())
    centers = np.concatenate(centers)
    contexts = np.concatenate(contexts)

    W = rng.normal(0, 0.1, size=(n, d))  # input (returned) embeddings
    C = rng.normal(0, 0.1, size=(n, d))  # output/context embeddings
    batch = 4096
    for _ in range(epochs):
        perm = rng.permutation(len(centers))
        for lo in range(0, len(perm), batch):
            idx = perm[lo : lo + batch]
            ci, xi = centers[idx], contexts[idx]
            neg = rng.integers(0, n, size=(len(idx), n_neg))
            wc = W[ci]  # (b, d)
            # positive pairs
            pos_score = 1.0 / (1.0 + np.exp(-np.clip((wc * C[xi]).sum(-1), -30, 30)))
            gpos = (pos_score - 1.0)[:, None]  # dL/dscore
            # negatives
            cneg = C[neg]  # (b, k, d)
            neg_score = 1.0 / (1.0 + np.exp(-np.clip(np.einsum("bd,bkd->bk", wc, cneg), -30, 30)))
            gneg = neg_score[:, :, None]
            gw = gpos * C[xi] + np.einsum("bk,bkd->bd", neg_score, cneg)
            np.add.at(W, ci, -lr * gw)
            np.add.at(C, xi, -lr * (gpos * wc))
            np.add.at(C.reshape(-1, d), neg.ravel(), -lr * (gneg * wc[:, None, :]).reshape(-1, d))
    return W
