"""Benchmark: regenerate paper Table III (method comparison, 7 methods × 6
datasets). The assertion checks the paper's headline shape: ZeroED has the
best mean F1 across datasets."""
import numpy as np


def test_table3(spark, benchmark, save_rows):
    from repro.exp.tables import table3_rows

    rows = benchmark.pedantic(table3_rows, args=(spark,), rounds=1, iterations=1)
    save_rows("table3", rows)
    by_method: dict[str, list[float]] = {}
    for r in rows:
        by_method.setdefault(r["method"], []).append(r["f1"])
    means = {m: float(np.mean(v)) for m, v in by_method.items()}
    best = max(means, key=means.get)
    assert best == "ZeroED", f"expected ZeroED to lead on mean F1: {means}"
