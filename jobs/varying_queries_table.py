"""spark-submit entrypoint reproducing Fig 12.

Usage: spark-submit jobs/varying_queries_table.py
"""
import sys, os
sys.path.insert(0, os.path.join(os.path.dirname(__file__), ""))
from _session import get_spark
from repro.experiments.common import format_table
from repro.experiments.cases import varying_queries_table


def main():
    spark = get_spark()
    rows, _ = varying_queries_table(spark); print(format_table(rows, 'Fig 12'))


if __name__ == "__main__":
    main()
