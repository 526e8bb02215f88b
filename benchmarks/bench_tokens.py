"""Benchmark: token-cost comparison (Fig. 8's claim — ZeroED's token usage
grows sublinearly vs FM_ED's linear growth, large reduction at scale)."""


def test_token_cost(spark, benchmark, save_rows):
    from repro.exp.tables import token_cost_rows

    rows = benchmark.pedantic(token_cost_rows, args=(spark,), rounds=1, iterations=1)
    save_rows("tokens", rows)
    # reduction must grow with dataset size (FM_ED linear, ZeroED sublinear)
    # and be positive at the largest size; the paper's 90 % figure is the
    # asymptote of this trend at its 200k-tuple scale
    reductions = [r["reduction_pct"] for r in rows]
    assert reductions == sorted(reductions), reductions
    assert reductions[-1] > 20.0, reductions
    # FM_ED's cost is input-dominated and grows ~linearly with rows;
    # ZeroED's grows sublinearly (sampled labeling budget)
    top, mid = rows[-1], rows[-2]
    assert top["fm_ed_in"] > top["fm_ed_out"]
    fm_growth = top["fm_ed_tokens"] / mid["fm_ed_tokens"]
    zeroed_growth = top["zeroed_tokens"] / mid["zeroed_tokens"]
    assert zeroed_growth < fm_growth, (zeroed_growth, fm_growth)
