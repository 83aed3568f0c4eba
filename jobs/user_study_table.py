"""spark-submit entrypoint reproducing Tables 7/8/9.

Usage: spark-submit jobs/user_study_table.py
"""
import sys, os
sys.path.insert(0, os.path.join(os.path.dirname(__file__), ""))
from _session import get_spark
from repro.experiments.common import format_table
from repro.experiments.cases import user_study_tables


def main():
    spark = get_spark()
    rows, meta = user_study_tables(spark); print(format_table(rows, f'Table 8 (Table 9 machinery: {meta})'))


if __name__ == "__main__":
    main()
