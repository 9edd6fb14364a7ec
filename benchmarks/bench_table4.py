"""Benchmark: the Table IV ablation pipeline (PT city, reduced scale)."""
import pytest

from repro.evalx.tables import historical_costs, table4_city
from repro.traj.datasets import build_city
from repro.trmma.ablations import train_ablation_suite


@pytest.mark.benchmark(group="table4")
def test_table4_pt(benchmark, spark):
    city = build_city(spark, "pt", n_traj=200, seed=1)

    def run():
        recs = train_ablation_suite(city, mma_epochs=5, trmma_epochs=3,
                                    costs=historical_costs(city),
                                    mma_augment=400, trmma_augment=150)
        return table4_city(spark, city, recoverers=recs)

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(out) == 8
    # headline shape: the full method beats the no-map-matching variants
    assert out["TRMMA"]["accuracy"] > out["Nearest+linear"]["accuracy"]
