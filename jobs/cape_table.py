"""spark-submit entrypoint reproducing Fig 13.

Usage: spark-submit jobs/cape_table.py
"""
import sys, os
sys.path.insert(0, os.path.join(os.path.dirname(__file__), ""))
from _session import get_spark
from repro.experiments.common import format_table
from repro.experiments.baselines_exp import cape_table


def main():
    spark = get_spark()
    rows, _ = cape_table(spark); print(format_table(rows, 'Fig 13'))


if __name__ == "__main__":
    main()
