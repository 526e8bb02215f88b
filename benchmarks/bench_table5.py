"""Benchmark: regenerate paper Table V (LLM tiers). The assertion checks
the paper's shape: qwen2.5-72b leads and gpt-4o-mini trails on mean F1."""
import numpy as np


def test_table5(spark, benchmark, save_rows):
    from repro.exp.tables import table5_rows

    rows = benchmark.pedantic(table5_rows, args=(spark,), rounds=1, iterations=1)
    save_rows("table5", rows)
    by_model: dict[str, list[float]] = {}
    for r in rows:
        by_model.setdefault(r["model"], []).append(r["f1"])
    means = {m: float(np.mean(v)) for m, v in by_model.items()}
    assert max(means, key=means.get) == "qwen2.5-72b", means
    assert min(means, key=means.get) == "gpt-4o-mini", means
