"""Benchmark: regenerate paper Table IV (ablations). The assertion checks
the paper's shape: the full system's mean F1 beats every ablation's."""
import numpy as np


def test_table4(spark, benchmark, save_rows):
    from repro.exp.tables import table4_rows

    rows = benchmark.pedantic(table4_rows, args=(spark,), rounds=1, iterations=1)
    save_rows("table4", rows)
    by_abl: dict[str, list[float]] = {}
    for r in rows:
        by_abl.setdefault(r["ablation"], []).append(r["f1"])
    means = {a: float(np.mean(v)) for a, v in by_abl.items()}
    for abl, mean in means.items():
        if abl != "ZeroED":
            assert means["ZeroED"] >= mean - 0.02, f"{abl} beats full system: {means}"
