"""Minimal neural-network substrate in pure numpy.

The container has no PyTorch, so every model in this reproduction (MMA,
TRMMA, and the learned baselines) runs on this package: a reverse-mode
autodiff core (:mod:`repro.nn.autodiff`), standard layers
(:mod:`repro.nn.layers`), a transformer encoder
(:mod:`repro.nn.transformer`), a GRU (:mod:`repro.nn.gru`), and Adam
(:mod:`repro.nn.optim`). Everything is float64 and deterministic given a
seed, which keeps the numerical gradient checks in ``tests/test_autodiff``
tight and the experiment tables reproducible.
"""
from repro.nn.autodiff import Tensor, concat, stack  # noqa: F401
from repro.nn.layers import MLP, Embedding, LayerNorm, Linear, Module  # noqa: F401
from repro.nn.optim import Adam  # noqa: F401
