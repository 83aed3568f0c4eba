"""Fig 12: runtime across the 10 workload queries (λ_F1-samp = 0.3).

Paper shape: runtime is relatively stable across queries and correlates
with the number of join graphs enumerated for the query.
"""
import pytest

from repro.experiments.cases import varying_queries_table
from repro.experiments.common import save_table


@pytest.mark.benchmark(group="fig12")
def test_varying_queries(spark, benchmark):
    rows, _ = benchmark.pedantic(
        lambda: varying_queries_table(spark), rounds=1, iterations=1
    )
    print(save_table(rows, "fig12_varying_queries",
                     "Fig 12: runtime per workload query"))
    assert len(rows) == 10
    assert all(r["runtime (s)"] > 0 for r in rows)
    assert all(r["# join graphs"] > 0 for r in rows)
