"""Fig 13: CAPE's top-3 counterbalance explanations for the NBA questions.

Paper shape: for "GSW wins high in 2015-16" CAPE returns seasons with low
wins; for "LeBron points low in 2010-11" it returns his high-points
seasons.
"""
import pytest

from repro.experiments.baselines_exp import cape_table
from repro.experiments.common import save_table


@pytest.mark.benchmark(group="fig13")
def test_cape_explanations(spark, benchmark):
    rows, _ = benchmark.pedantic(
        lambda: cape_table(spark), rounds=1, iterations=1
    )
    print(save_table(rows, "fig13_cape", "Fig 13: CAPE explanations"))
    cape1 = [r for r in rows if r["Query"] == "UQ_cape1"]
    cape2 = [r for r in rows if r["Query"] == "UQ_cape2"]
    assert len(cape1) == 3 and len(cape2) == 3
    assert all("GSW" in r["explanation"] for r in cape1)
    assert all("LeBron" in r["explanation"] for r in cape2)
