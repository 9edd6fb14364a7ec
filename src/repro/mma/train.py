"""Driver-side training for MMA (Eq. (10) objective).

Training data comes out of the city's Spark ``points`` DataFrame (train
split, observed points only → driver via Arrow ``toPandas``), is
featureised once, then optimised with Adam over shuffled mini-batches of
trajectories. Models are small (d≈32) and sparse trajectories short, so the
numpy loop trains each city in seconds at bench scale.
"""
from __future__ import annotations

import numpy as np

from repro.mma.features import K_C, MMASample, build_mma_sample
from repro.mma.model import MMAModel
from repro.nn.optim import Adam
from repro.roadnet.node2vec import node2vec_embeddings
from repro.traj.datasets import CityData


def augmented_trajs(city: CityData, n: int, seed: int = 0):
    """Extra simulated historical trajectories for cheap-to-train methods.

    The paper's datasets hold ~1-2.4 M trajectories; our Spark datasets are
    small so the table harnesses stay fast. Methods whose training is cheap
    (MMA, TRMMA, DeepMM — the paper's own orders-of-magnitude-faster-
    training claim) additionally draw simulated trajectories from the same
    city distribution, emulating the large-history regime. Documented in
    DESIGN.md §2.
    """
    from repro.traj.datasets import CITY_PRESETS
    from repro.traj.generate import simulate_city_trajectories

    if n <= 0:
        return []
    p = CITY_PRESETS[city.name]
    return simulate_city_trajectories(
        city.net, n, eps=p["eps"], target_len=p["target_len"], speed_mu=p["speed"],
        noise_sigma=p["noise"], gamma=city.gamma, seed=500000 + seed,
        outlier_p=0.03, kin_seed=p["net_seed"] + 7,
    )


def mma_training_samples(
    city: CityData,
    split: str = "train",
    k_c: int = K_C,
    use_direction: bool = True,
    max_traj: int | None = None,
    augment: int = 0,
    seed: int = 0,
) -> list[MMASample]:
    """Featureised observed-point sequences for a split (+ augmentation)."""
    samples = []
    for tr in city.trajs(split)[: max_traj or None] + augmented_trajs(city, augment, seed):
        obs = np.where(tr.observed)[0]
        if len(obs) < 2:
            continue
        samples.append(
            build_mma_sample(
                city.net,
                city.index,
                tr.x[obs],
                tr.y[obs],
                tr.t[obs],
                tr.t0,
                city.norm,
                true_seg=tr.seg[obs],
                k_c=k_c,
                use_direction=use_direction,
            )
        )
    return samples


def train_mma(
    city: CityData,
    epochs: int = 8,
    lr: float = 2e-3,
    d: int = 32,
    batch: int = 8,
    seed: int = 0,
    use_context: bool = True,
    use_direction: bool = True,
    n2v: np.ndarray | None = None,
    samples: list[MMASample] | None = None,
    augment: int = 0,
    verbose: bool = False,
) -> MMAModel:
    """Train MMA on a city's train split; returns the fitted model.

    ``use_context`` / ``use_direction`` drive the paper's -C / -DI
    ablations. ``n2v`` lets callers reuse pre-trained Node2Vec embeddings
    across model variants (they are deterministic per city anyway).
    """
    if n2v is None:
        n2v = node2vec_embeddings(city.net, d=d, seed=seed)
    if samples is None:
        samples = mma_training_samples(city, use_direction=use_direction, augment=augment, seed=seed)
    model = MMAModel(
        city.net.n_segments, d0=d, d2=d, seed=seed, n2v_init=n2v, use_context=use_context
    )
    opt = Adam(model.parameters(), lr=lr)
    rng = np.random.default_rng(seed)
    for ep in range(epochs):
        if ep == (epochs * 3) // 4:
            opt.lr *= 0.3  # simple step decay for the final quarter
        order = rng.permutation(len(samples))
        total = 0.0
        for lo in range(0, len(order), batch):
            opt.zero_grad()
            chunk = order[lo : lo + batch]
            losses = [model.loss(samples[i]) for i in chunk]
            loss = losses[0]
            for l in losses[1:]:
                loss = loss + l
            loss = loss * (1.0 / len(chunk))
            loss.backward()
            opt.step()
            total += loss.item() * len(chunk)
        if verbose:
            print(f"[mma:{city.name}] epoch {ep + 1}/{epochs} loss={total / len(samples):.4f}")
    return model
