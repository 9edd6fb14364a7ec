"""Benchmark: the Table V map-matching pipeline (PT city, reduced scale).

The full 4-city table is produced by ``jobs/table5_map_matching.py``; this
benchmark exercises the same code path at a size that completes quickly and
asserts the headline shape (MMA beats Nearest by a wide margin).
"""
import pytest

from repro.evalx.tables import build_matchers, table5_city
from repro.traj.datasets import build_city


@pytest.mark.benchmark(group="table5")
def test_table5_pt(benchmark, spark):
    city = build_city(spark, "pt", n_traj=200, seed=1)

    def run():
        matchers = build_matchers(city, epochs=5, mma_augment=400, deepmm_augment=200)
        return table5_city(spark, city, matchers=matchers)

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert set(out) == {"Nearest", "FMM", "LHMM", "RNTrajRec", "DeepMM", "GraphMM", "MMA"}
    assert out["MMA"]["f1"] > out["Nearest"]["f1"] + 0.03
