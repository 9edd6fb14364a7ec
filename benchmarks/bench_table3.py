"""Benchmark: the Table III recovery pipeline (PT city, reduced scale).

The full 4-city table is produced by ``jobs/table3_recovery.py``.
"""
import pytest

from repro.evalx.tables import build_recoverers, table3_city
from repro.traj.datasets import build_city


@pytest.mark.benchmark(group="table3")
def test_table3_pt(benchmark, spark):
    city = build_city(spark, "pt", n_traj=200, seed=1)

    def run():
        recs = build_recoverers(city, epochs=2, mma_epochs=5, trmma_epochs=3,
                                mma_augment=400, trmma_augment=150)
        return table3_city(spark, city, recoverers=recs)

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(out) == 10
    # headline shape: TRMMA is the best learned method on accuracy
    learned = [k for k in out if k not in ("Linear", "TRMMA")]
    assert out["TRMMA"]["accuracy"] > max(out[k]["accuracy"] for k in learned)
