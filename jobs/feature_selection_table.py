"""spark-submit entrypoint reproducing Fig 7/7a.

Usage: spark-submit jobs/feature_selection_table.py
"""
import sys, os
sys.path.insert(0, os.path.join(os.path.dirname(__file__), ""))
from _session import get_spark
from repro.experiments.common import format_table
from repro.experiments.runtime import feature_selection_table


def main():
    spark = get_spark()
    rows, meta = feature_selection_table(spark, 'nba'); print(format_table(rows, f'Fig 7a NBA {meta}')); rows, meta = feature_selection_table(spark, 'mimic'); print(format_table(rows, f'Fig 7 MIMIC {meta}'))


if __name__ == "__main__":
    main()
