"""Tables 7/8/9: the user-study explanations' machine metrics.

The human panel cannot be reproduced; this bench reproduces the machine
rows of Table 8 (F-score/recall/precision of the ten fixed Table-7
explanations on UQ_1) and exercises Table 9's ranking-quality machinery
against simulated ratings (DESIGN.md substitution #6). The paper's average
user ratings are carried alongside for reference.
"""
import pytest

from repro.experiments.cases import user_study_tables
from repro.experiments.common import save_table


@pytest.mark.benchmark(group="table8")
def test_user_study_metrics(spark, benchmark):
    rows, meta = benchmark.pedantic(
        lambda: user_study_tables(spark), rounds=1, iterations=1
    )
    print(save_table(rows, "table8_user_study",
                     f"Table 8: explanation metrics; Table 9 machinery: {meta}"))
    assert len(rows) == 10
    by_name = {r["Explanation"]: r for r in rows}
    # Expl2 (regular-season) has full recall by construction.
    assert by_name["Expl2"]["recall"] >= 0.9
    # Expl7 (Green minutes>15) separates the seasons on planted data.
    assert by_name["Expl7"]["F-score"] > 0.5
    # Expl10 is the low-quality control.
    assert by_name["Expl10"]["F-score"] < by_name["Expl7"]["F-score"]
    for key in ("ndcg_F-score", "kendall_tau_F-score"):
        assert key in meta
