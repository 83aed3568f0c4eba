"""Fig 10: effect of sampling on runtime and pattern quality.

10a — APT stats of the four reference join graphs;
10b–e — LCA sample rate vs candidate-generation runtime + top-10 match;
10f–g — λ_F1-samp vs NDCG / top-10 recall of the final ranking.
"""
import pytest

from repro.experiments.common import save_table
from repro.experiments.sampling import (
    apt_stats_table,
    f1_sampling_table,
    lca_sampling_table,
)


@pytest.mark.benchmark(group="fig10a")
def test_apt_stats_table(spark, benchmark):
    rows, _ = benchmark.pedantic(
        lambda: apt_stats_table(spark), rounds=1, iterations=1
    )
    print(save_table(rows, "fig10a_apt_stats", "Fig 10a: APT statistics"))
    assert [r["join graph"] for r in rows] == ["Ω1", "Ω2", "Ω3", "Ω4"]
    # Ω2/Ω4 augment Ω1/Ω3 → at least as many rows and attributes.
    assert rows[1]["APT (#rows)"] >= rows[0]["APT (#rows)"]
    assert rows[3]["# attributes"] > rows[2]["# attributes"]


@pytest.mark.benchmark(group="fig10be")
def test_lca_sampling(spark, benchmark):
    rows, _ = benchmark.pedantic(
        lambda: lca_sampling_table(spark), rounds=1, iterations=1
    )
    print(save_table(rows, "fig10be_lca_sampling",
                     "Fig 10b-e: LCA sampling vs runtime and match@10"))
    assert {r["join graph"] for r in rows} == {"Ω1", "Ω2", "Ω3", "Ω4"}
    assert all(0 <= r["match@10"] <= 10 for r in rows)


@pytest.mark.benchmark(group="fig10fg")
def test_f1_sampling_quality(spark, benchmark):
    rows, _ = benchmark.pedantic(
        lambda: f1_sampling_table(spark), rounds=1, iterations=1
    )
    print(save_table(rows, "fig10fg_f1_sampling",
                     "Fig 10f-g: F1 sampling vs NDCG / recall@10"))
    assert rows
    for r in rows:
        assert 0.0 <= r["NDCG"] <= 1.0
        assert 0.0 <= r["recall@10"] <= 1.0
