"""Benchmark: regenerate paper Table II (dataset statistics)."""


def test_table2(benchmark, save_rows):
    from repro.exp.tables import table2_rows

    rows = benchmark.pedantic(table2_rows, rounds=1, iterations=1)
    save_rows("table2", rows)
    assert len(rows) == 7
    for r in rows:
        assert r["tuples"] > 0
        if r["dataset"] != "tax":  # tax uses a raised rate (see registry)
            assert abs(r["err_pct"] - r["paper_err_pct"]) < 1.0
