"""Reproduce paper Table VI: sampling methods (spark-submit entrypoint).

Usage: spark-submit jobs/run_table6.py
"""
from jobs._common import get_spark
from repro.exp.tables import format_rows, table6_rows


def main() -> None:
    spark = get_spark("table6")
    rows = table6_rows(spark)
    keys = ["dataset", "sampling", "prec", "rec", "f1", "paper_prec", "paper_rec", "paper_f1"]
    print("Table VI — clustering/sampling methods (measured vs paper)")
    print(format_rows(rows, keys))
    spark.stop()


if __name__ == "__main__":
    main()
