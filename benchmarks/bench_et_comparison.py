"""Fig 11 + Table 10: CaJaDE vs Explanation Tables on one APT.

Paper shape: ET's runtime grows quadratically with its sample size
(cross-product candidate generation) while CaJaDE's sample-driven mining
grows much more slowly — ~50× faster at sample size 512.
"""
import pytest

from repro.experiments.baselines_exp import et_comparison_table
from repro.experiments.common import format_table, save_table


@pytest.mark.benchmark(group="fig11")
def test_et_comparison(spark, benchmark):
    rows, meta = benchmark.pedantic(
        lambda: et_comparison_table(spark), rounds=1, iterations=1
    )
    print(save_table(rows, "fig11_et_runtime",
                     f"Fig 11: CaJaDE vs ET runtime, {meta['apt_rows']} APT rows"))
    pat_rows = [
        {"Num": f"Pattern {i+1}", "Pattern Description": d}
        for i, d in enumerate(meta["et_top_patterns"])
    ]
    print(save_table(pat_rows, "table10_et_patterns",
                     "Table 10: first ET patterns"))
    assert [r["sample size"] for r in rows] == [16, 32, 64, 128, 256, 512]
    # ET slows superlinearly with sample size; CaJaDE stays flat-ish.
    et16 = rows[0]["ET (s)"]
    et512 = rows[-1]["ET (s)"]
    assert et512 > et16 * 4
    assert rows[-1]["CaJaDE (s)"] < et512
