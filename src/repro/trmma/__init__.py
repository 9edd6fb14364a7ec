"""TRMMA — sparse Trajectory Recovery with MMA (paper §V).

Given a sparse trajectory ``T`` and its route ``R`` (from MMA), TRMMA
recovers the map-matched ε-sampling trajectory ``T_ε`` with a DualFormer
encoder (transformer over T ⊕ transformer over R, fused by attention,
Eqs. 11-14) and a GRU multitask decoder that classifies each missing
point's segment among the *route's* segments (Eqs. 15-17) and regresses its
position ratio (Eq. 18).
"""
from repro.trmma.model import TRMMAModel, TrmmaSample  # noqa: F401
from repro.trmma.train import train_trmma  # noqa: F401
