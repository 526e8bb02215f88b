"""Reproduce paper Table II: dataset statistics (spark-submit entrypoint).

Usage: spark-submit jobs/run_table2.py   (or plain ``python``).
"""
from repro.exp.tables import format_rows, table2_rows


def main() -> None:
    rows = table2_rows()
    keys = [
        "dataset", "tuples", "attrs", "err_pct", "mv_pct", "pv_pct",
        "t_pct", "o_pct", "rv_pct", "paper_tuples", "paper_err_pct",
    ]
    print("Table II — dataset statistics (measured vs paper)")
    print(format_rows(rows, keys))


if __name__ == "__main__":
    main()
