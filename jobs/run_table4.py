"""Reproduce paper Table IV: ablation study (spark-submit entrypoint).

Usage: spark-submit jobs/run_table4.py [dataset ...]
"""
import sys

from jobs._common import get_spark
from repro.datasets.registry import TABLE3_DATASETS
from repro.exp.tables import format_rows, table4_rows


def main() -> None:
    datasets = sys.argv[1:] or TABLE3_DATASETS
    spark = get_spark("table4")
    rows = table4_rows(spark, datasets=datasets)
    keys = ["dataset", "ablation", "prec", "rec", "f1", "paper_prec", "paper_rec", "paper_f1"]
    print("Table IV — ablation study (measured vs paper)")
    print(format_rows(rows, keys))
    spark.stop()


if __name__ == "__main__":
    main()
