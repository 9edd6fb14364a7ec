"""Trajectory substrate: simulation of ground-truth driven routes with
ε-sampled map-matched points and noisy GPS observations, sparsification,
route/trajectory geometry helpers, and the four synthetic city datasets as
Spark DataFrames (substituting the paper's PT/XA/BJ/CD data — DESIGN.md §2).
"""
from repro.traj.generate import simulate_city_trajectories  # noqa: F401
from repro.traj.datasets import CITY_PRESETS, build_city  # noqa: F401
