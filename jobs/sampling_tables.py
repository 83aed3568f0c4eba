"""spark-submit entrypoint reproducing Fig 10.

Usage: spark-submit jobs/sampling_tables.py
"""
import sys, os
sys.path.insert(0, os.path.join(os.path.dirname(__file__), ""))
from _session import get_spark
from repro.experiments.common import format_table
from repro.experiments.sampling import apt_stats_table, lca_sampling_table, f1_sampling_table


def main():
    spark = get_spark()
    rows, _ = apt_stats_table(spark); print(format_table(rows, 'Fig 10a')); rows, _ = lca_sampling_table(spark); print(format_table(rows, 'Fig 10b-e')); rows, _ = f1_sampling_table(spark); print(format_table(rows, 'Fig 10f-g'))


if __name__ == "__main__":
    main()
