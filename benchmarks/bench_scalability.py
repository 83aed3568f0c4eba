"""Fig 9: scalability in database size (runtime vs SF per λ_F1-samp, plus
the per-step breakdown at the largest SF).

Paper shape: sublinear growth in database size; sampling's benefit grows
with database size; F-score calculation dominates at large sizes.
"""
import pytest

from repro.experiments.common import save_table
from repro.experiments.runtime import scalability_table


@pytest.mark.benchmark(group="fig9")
@pytest.mark.parametrize(
    "dataset,sfs",
    [("nba", (0.05, 0.1, 0.2)), ("mimic", (0.05, 0.1))],
    ids=["nba", "mimic"],
)
def test_scalability(spark, benchmark, dataset, sfs):
    rows, meta = benchmark.pedantic(
        lambda: scalability_table(spark, dataset, sfs=sfs),
        rounds=1,
        iterations=1,
    )
    print(
        save_table(
            rows,
            f"fig9_scalability_{dataset}",
            f"Fig 9 ({dataset}): runtime (s) vs scale factor; "
            f"breakdown@max={meta['breakdown_at_max_sf']}",
        )
    )
    assert len(rows) == len(sfs)
    # Sub-linear-ish: growing SF by 4x must not grow runtime by > 8x.
    first, last = rows[0], rows[-1]
    ratio = last["f1_samp=0.1"] / max(first["f1_samp=0.1"], 1e-9)
    sf_ratio = sfs[-1] / sfs[0]
    assert ratio < sf_ratio * 2.5
