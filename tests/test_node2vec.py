"""Tests for Node2Vec-lite segment embeddings."""
import numpy as np

from repro.roadnet.node2vec import _walks, node2vec_embeddings


def test_walk_validity(net_small):
    rng = np.random.default_rng(0)
    walks = _walks(net_small, 2, 8, rng)
    assert walks.shape == (net_small.n_segments * 2, 8)
    # every consecutive pair is a successor step (or a stay at a dead end)
    for row in walks[:30]:
        for a, b in zip(row, row[1:]):
            assert b in net_small.successors(int(a)) or a == b


def test_embedding_shape_and_determinism(net_small):
    e1 = node2vec_embeddings(net_small, d=12, epochs=1, seed=3)
    e2 = node2vec_embeddings(net_small, d=12, epochs=1, seed=3)
    assert e1.shape == (net_small.n_segments, 12)
    assert np.allclose(e1, e2)
    e3 = node2vec_embeddings(net_small, d=12, epochs=1, seed=4)
    assert not np.allclose(e1, e3)


def test_embeddings_capture_locality(net_small):
    emb = node2vec_embeddings(net_small, d=16, epochs=2, seed=0)
    norm = emb / np.linalg.norm(emb, axis=1, keepdims=True)
    succ_sims, rand_sims = [], []
    rng = np.random.default_rng(1)
    for s in range(0, net_small.n_segments, 7):
        for t in net_small.successors(s):
            succ_sims.append(float(norm[s] @ norm[int(t)]))
        rand_sims.append(float(norm[s] @ norm[rng.integers(net_small.n_segments)]))
    assert np.mean(succ_sims) > np.mean(rand_sims) + 0.08


def test_embeddings_finite(net_small):
    emb = node2vec_embeddings(net_small, d=8, epochs=1)
    assert np.isfinite(emb).all()
