"""spark-submit entrypoint reproducing Table 6.

Usage: spark-submit jobs/mimic_case_study.py
"""
import sys, os
sys.path.insert(0, os.path.join(os.path.dirname(__file__), ""))
from _session import get_spark
from repro.experiments.common import format_table
from repro.experiments.cases import case_study_table


def main():
    spark = get_spark()
    rows, _ = case_study_table(spark, 'mimic'); print(format_table(rows, 'Table 6'))


if __name__ == "__main__":
    main()
