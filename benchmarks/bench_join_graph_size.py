"""Fig 8: total runtime varying λ_#edges × λ_F1-samp (NBA, query Q1).

Paper shape: runtime increases sharply with λ_#edges (join-graph count
explodes) and sampling for F-score calculation helps most at larger
λ_#edges.
"""
import pytest

from repro.experiments.common import save_table
from repro.experiments.runtime import jg_size_table


@pytest.mark.benchmark(group="fig8")
def test_jg_size_vs_f1_sampling(spark, benchmark):
    rows, meta = benchmark.pedantic(
        lambda: jg_size_table(
            spark, "nba", edge_counts=(1, 2), f1_rates=(0.1, 0.3, 1.0)
        ),
        rounds=1,
        iterations=1,
    )
    print(save_table(rows, "fig8_jg_size", f"Fig 8: runtime (s), {meta}"))
    assert len(rows) == 2
    # More edges → more join graphs → more runtime.
    assert rows[1]["n_join_graphs"] > rows[0]["n_join_graphs"]
    assert rows[1]["f1_samp=0.1"] > rows[0]["f1_samp=0.1"]
