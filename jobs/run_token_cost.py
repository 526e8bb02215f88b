"""Reproduce the paper's token-cost comparison (Fig. 8's numbers):
ZeroED vs FM_ED token usage on growing Tax subsets.

Usage: spark-submit jobs/run_token_cost.py
"""
from jobs._common import get_spark
from repro.exp.tables import format_rows, token_cost_rows


def main() -> None:
    spark = get_spark("token_cost")
    rows = token_cost_rows(spark)
    keys = [
        "n_tuples", "zeroed_tokens", "fm_ed_tokens", "reduction_pct",
        "zeroed_in", "zeroed_out", "fm_ed_in", "fm_ed_out",
    ]
    print("Token cost — ZeroED vs FM_ED on Tax subsets (paper: up to ~90% reduction)")
    print(format_rows(rows, keys))
    spark.stop()


if __name__ == "__main__":
    main()
