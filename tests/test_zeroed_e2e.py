"""End-to-end ZeroED tests on a tiny hospital instance (session-cached)."""
import pytest

from repro.core.zeroed import ZeroEDConfig, ablation_configs


def test_mask_shape(hospital_result, hospital_tiny):
    assert hospital_result.mask.shape == hospital_tiny.dirty.shape
    assert set(hospital_result.mask.columns) == set(hospital_tiny.attrs)


def test_detection_quality(hospital_result):
    m = hospital_result.metrics
    assert m["f1"] > 0.5, f"tiny-hospital F1 too low: {m}"
    assert m["prec"] > 0.5


def test_token_usage_accounted(hospital_result):
    u = hospital_result.usage
    assert u.total_tokens > 0
    for purpose in ("criteria", "guideline", "labeling", "contrastive", "augmentation"):
        assert purpose in u.by_purpose, f"missing LLM purpose {purpose}"


def test_diagnostics_populated(hospital_result, hospital_tiny):
    d = hospital_result.diagnostics
    assert set(d["n_criteria"]) == set(hospital_tiny.attrs)
    assert all(v >= 1 for v in d["n_criteria"].values())
    assert sum(d["n_labeled"].values()) > 0


def test_rerun_uses_stage_cache_and_is_stable(hospital_runner, hospital_result):
    res2 = hospital_runner.run(ZeroEDConfig(label_rate=0.1))
    assert res2.metrics == hospital_result.metrics
    # cached stages re-charge the same usage for a faithful cost report
    assert res2.usage.total_tokens == hospital_result.usage.total_tokens


def test_ablation_configs_flags():
    cfgs = ablation_configs(ZeroEDConfig())
    assert not cfgs["w/o. Guid."].use_guidelines
    assert not cfgs["w/o. Crit."].use_criteria
    assert not cfgs["w/o. Corr."].use_correlated
    assert not cfgs["w/o. Veri."].use_verification
    assert cfgs["ZeroED"] == ZeroEDConfig()


@pytest.mark.parametrize("flag", ["use_guidelines", "use_criteria", "use_correlated", "use_verification"])
def test_ablations_run(hospital_runner, flag):
    cfg = ZeroEDConfig(label_rate=0.1, **{flag: False})
    res = hospital_runner.run(cfg)
    assert 0.0 <= res.metrics["f1"] <= 1.0


def test_without_criteria_feature_dim_shrinks(hospital_runner):
    feats_with = hospital_runner._features(ZeroEDConfig(label_rate=0.1), 2)
    feats_without = hospital_runner._features(
        ZeroEDConfig(label_rate=0.1, use_criteria=False), 2
    )
    a = hospital_runner.ds.attrs[0]
    assert feats_without["ctx"].full_dim(a) < feats_with["ctx"].full_dim(a)


def test_without_correlated_no_related(hospital_runner):
    feats = hospital_runner._features(
        ZeroEDConfig(label_rate=0.1, use_correlated=False), 0
    )
    assert all(v == [] for v in feats["ctx"].related.values())


def test_sampling_methods_run(hospital_runner):
    for method in ("agc", "random"):
        res = hospital_runner.run(ZeroEDConfig(label_rate=0.1, sampling=method))
        assert 0.0 <= res.metrics["f1"] <= 1.0


def test_weak_model_underperforms(hospital_runner, hospital_result):
    weak = hospital_runner.run(ZeroEDConfig(label_rate=0.1, model="gpt-4o-mini"))
    assert weak.metrics["f1"] < hospital_result.metrics["f1"]
