"""spark-submit entrypoint reproducing Fig 9.

Usage: spark-submit jobs/scalability_table.py
"""
import sys, os
sys.path.insert(0, os.path.join(os.path.dirname(__file__), ""))
from _session import get_spark
from repro.experiments.common import format_table
from repro.experiments.runtime import scalability_table


def main():
    spark = get_spark()
    rows, meta = scalability_table(spark, 'nba'); print(format_table(rows, f'Fig 9 NBA {meta}')); rows, meta = scalability_table(spark, 'mimic', sfs=(0.05, 0.1)); print(format_table(rows, f'Fig 9 MIMIC {meta}'))


if __name__ == "__main__":
    main()
