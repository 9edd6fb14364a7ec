"""TRMMA ablations (Table IV of the paper).

Eight variants, each a recoverer for :func:`repro.trmma.infer.run_recovery`:

* **TRMMA** — the full method (MMA matching + DualFormer + decoder).
* **TRMMA-HMM** — MMA replaced by the FMM HMM matcher.
* **TRMMA-Near** — MMA replaced by nearest-segment matching.
* **MMA+linear** — MMA matching, linear interpolation instead of the model.
* **Nearest+linear** — nearest matching + linear interpolation.
* **TRMMA-DF** — no DualFormer fusion (H = R), trained separately.
* **TRMMA-C** — MMA trained without candidate context in point embeddings.
* **TRMMA-DI** — MMA trained/run without directional cosine features.
"""
from __future__ import annotations

import numpy as np

from repro.mma.baselines import HMMMatcher, MMAMatcher, NearestMatcher
from repro.mma.train import train_mma
from repro.roadnet.node2vec import node2vec_embeddings
from repro.traj.datasets import CityData
from repro.trmma.baselines import LinearRecoverer
from repro.trmma.infer import TRMMARecoverer
from repro.trmma.train import segment_time_stats, train_trmma


def train_ablation_suite(
    city: CityData,
    mma_epochs: int = 8,
    trmma_epochs: int = 4,
    seed: int = 0,
    costs: np.ndarray | None = None,
    mma_augment: int = 800,
    trmma_augment: int = 250,
    verbose: bool = False,
) -> dict[str, object]:
    """Train every model variant once and assemble the 8 recoverers.

    Returns ``{name: recoverer}`` in the paper's Table IV row order. The
    heavy pieces (Node2Vec, time stats, the training data incl. simulated
    history) are shared across variants exactly as the ablation design
    requires.
    """
    from repro.trmma.train import segment_time_stats_trajs, trmma_train_trajs, trmma_training_samples

    net, index, norm = city.net, city.index, city.norm
    n2v = node2vec_embeddings(net, d=32, seed=seed)
    hist = trmma_train_trajs(city, augment=trmma_augment, seed=seed)
    tpm = segment_time_stats_trajs(net, hist, city.eps)
    samples = trmma_training_samples(city, time_per_meter=tpm, trajs=hist)

    mma = train_mma(city, epochs=mma_epochs, seed=seed, n2v=n2v, augment=mma_augment, verbose=verbose)
    mma_nc = train_mma(city, epochs=mma_epochs, seed=seed, n2v=n2v, use_context=False,
                       augment=mma_augment, verbose=verbose)
    mma_ndi = train_mma(city, epochs=mma_epochs, seed=seed, n2v=n2v, use_direction=False,
                        augment=mma_augment, verbose=verbose)
    trmma = train_trmma(city, epochs=trmma_epochs, seed=seed, n2v=n2v, time_per_meter=tpm,
                        samples=samples, verbose=verbose)
    trmma_df = train_trmma(
        city, epochs=trmma_epochs, seed=seed, n2v=n2v, time_per_meter=tpm,
        samples=samples, use_dualformer=False, verbose=verbose,
    )

    m_full = MMAMatcher(net, index, norm, mma)
    m_nc = MMAMatcher(net, index, norm, mma_nc)
    m_ndi = MMAMatcher(net, index, norm, mma_ndi, use_direction=False)
    m_hmm = HMMMatcher(net, index, norm)
    m_near = NearestMatcher(net, index, norm)

    def rec(matcher, model):
        return TRMMARecoverer(matcher, model, norm, city.eps, costs=costs, time_per_meter=tpm)

    return {
        "TRMMA": rec(m_full, trmma),
        "TRMMA-HMM": rec(m_hmm, trmma),
        "TRMMA-Near": rec(m_near, trmma),
        "MMA+linear": LinearRecoverer(m_full, city.eps, costs=costs),
        "Nearest+linear": LinearRecoverer(m_near, city.eps, costs=costs),
        "TRMMA-DF": rec(m_full, trmma_df),
        "TRMMA-C": rec(m_nc, trmma),
        "TRMMA-DI": rec(m_ndi, trmma),
    }
