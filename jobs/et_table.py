"""spark-submit entrypoint reproducing Fig 11 + Table 10.

Usage: spark-submit jobs/et_table.py
"""
import sys, os
sys.path.insert(0, os.path.join(os.path.dirname(__file__), ""))
from _session import get_spark
from repro.experiments.common import format_table
from repro.experiments.baselines_exp import et_comparison_table


def main():
    spark = get_spark()
    rows, meta = et_comparison_table(spark); print(format_table(rows, 'Fig 11')); print(format_table([{'Num': f'Pattern {i+1}', 'Pattern': d} for i, d in enumerate(meta['et_top_patterns'])], 'Table 10'))


if __name__ == "__main__":
    main()
