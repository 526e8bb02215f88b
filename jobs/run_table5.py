"""Reproduce paper Table V: LLM-tier comparison (spark-submit entrypoint).

Usage: spark-submit jobs/run_table5.py [dataset ...]
"""
import sys

from jobs._common import get_spark
from repro.datasets.registry import TABLE3_DATASETS
from repro.exp.tables import format_rows, table5_rows


def main() -> None:
    datasets = sys.argv[1:] or TABLE3_DATASETS
    spark = get_spark("table5")
    rows = table5_rows(spark, datasets=datasets)
    keys = ["dataset", "model", "prec", "rec", "f1", "paper_prec", "paper_rec", "paper_f1"]
    print("Table V — ZeroED with different LLMs (measured vs paper)")
    print(format_rows(rows, keys))
    spark.stop()


if __name__ == "__main__":
    main()
