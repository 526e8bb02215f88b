"""Benchmark: regenerate paper Table VI (sampling methods). The assertion
checks the paper's shape: clustering beats random sampling on mean F1."""
import numpy as np


def test_table6(spark, benchmark, save_rows):
    from repro.exp.tables import table6_rows

    rows = benchmark.pedantic(table6_rows, args=(spark,), rounds=1, iterations=1)
    save_rows("table6", rows)
    by_m: dict[str, list[float]] = {}
    for r in rows:
        by_m.setdefault(r["sampling"], []).append(r["f1"])
    means = {m: float(np.mean(v)) for m, v in by_m.items()}
    assert means["kmeans"] > means["random"], means
    assert means["agc"] > means["random"] - 0.02, means
