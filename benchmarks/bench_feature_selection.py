"""Fig 7a (NBA) / Fig 7 (MIMIC): feature-selection runtime breakdown.

Reproduces the per-step runtime table with feature selection at several
λ_F1-samp values vs without feature selection. The paper's headline shape:
"w/o feature sel." is dominated by F-score calculation (16749s vs 227s on
NBA) and total runtime grows with λ_F1-samp.
"""
import pytest

from repro.experiments.common import save_table
from repro.experiments.runtime import feature_selection_table


@pytest.mark.benchmark(group="fig7")
@pytest.mark.parametrize("dataset", ["nba", "mimic"])
def test_feature_selection_breakdown(spark, benchmark, dataset):
    rows, meta = benchmark.pedantic(
        lambda: feature_selection_table(spark, dataset),
        rounds=1,
        iterations=1,
    )
    print(save_table(rows, f"fig7_feature_selection_{dataset}",
                     f"Fig 7 ({dataset}): runtime breakdown (s), {meta}"))
    steps = {r["Step"] for r in rows}
    assert {"Feature Selection", "F-score Calc.", "total"} <= steps
    naive = next(r for r in rows if r["Step"] == "Feature Selection")
    # Without feature selection the FS step must not run.
    assert naive["w/o feature sel."] == "N/A"
    totals = next(r for r in rows if r["Step"] == "total")
    # Sampled F-score calculation must beat the unsampled run.
    assert totals["fs 0.1"] <= totals["fs 1.0"] * 1.5
