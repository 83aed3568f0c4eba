"""spark-submit entrypoint reproducing Fig 8.

Usage: spark-submit jobs/join_graph_size_table.py
"""
import sys, os
sys.path.insert(0, os.path.join(os.path.dirname(__file__), ""))
from _session import get_spark
from repro.experiments.common import format_table
from repro.experiments.runtime import jg_size_table


def main():
    spark = get_spark()
    rows, meta = jg_size_table(spark, 'nba'); print(format_table(rows, f'Fig 8 {meta}'))


if __name__ == "__main__":
    main()
