"""Tests for Algorithm 1 (training-data construction)."""
import numpy as np
import pytest

from repro.llm.model import SimulatedLLM
from repro.sampling.cluster import AttrClustering
from repro.training.construct import construct_training_data, propagate_labels


def _clustering(assign, reps):
    return AttrClustering(np.array(assign), reps)


def test_propagate_labels_basic():
    cl = _clustering([0, 0, 1, 1, 2], {0: 0, 1: 2, 2: 4})
    out = propagate_labels(cl, {0: 1, 2: 0, 4: 0})
    assert out == {0: 1, 1: 1, 2: 0, 3: 0, 4: 0}


def test_propagate_skips_unlabeled_clusters():
    cl = _clustering([0, 0, 1], {0: 0, 1: 2})
    out = propagate_labels(cl, {0: 1})
    assert out == {0: 1, 1: 1}


@pytest.fixture(scope="module")
def constructed(hospital_tiny):
    llm = SimulatedLLM(seed=0)
    n = len(hospital_tiny.dirty)
    # simple 10-cluster partition with ground-truth labels on reps (module
    # tests isolate Algorithm 1 from upstream labeling quality)
    assign = np.arange(n) % 10
    reps = {c: int(np.flatnonzero(assign == c)[0]) for c in range(10)}
    rep_labels = {
        p: int(hospital_tiny.error_mask["state"].iloc[p]) for p in reps.values()
    }
    td = construct_training_data(
        llm, hospital_tiny.dirty, "state", _clustering(assign, reps), rep_labels,
        ["city", "county"],
    )
    return td, llm


def test_construct_outputs(constructed, hospital_tiny):
    td, _ = constructed
    n = len(hospital_tiny.dirty)
    assert len(td.real_positions) + td.n_evicted <= n
    assert len(td.real_positions) == len(td.real_labels)
    assert all(0 <= p < n for p in td.real_positions)


def test_construct_balances_classes(constructed):
    td, _ = constructed
    if td.n_clean > 0:
        # synthetic errors close (or cap) the class gap
        assert td.n_errors >= min(td.n_clean, sum(td.real_labels) + 1) or td.synth_rows


def test_synth_rows_have_full_context(constructed, hospital_tiny):
    td, _ = constructed
    for r in td.synth_rows[:10]:
        assert set(r) == set(hospital_tiny.dirty.columns)


def test_refined_criteria_present(constructed):
    td, _ = constructed
    kinds = {c.kind for c in td.refined_criteria}
    assert "not_missing" in kinds


def test_without_verification_skips_refinement(hospital_tiny):
    llm = SimulatedLLM(seed=0)
    n = len(hospital_tiny.dirty)
    assign = np.arange(n) % 5
    reps = {c: int(np.flatnonzero(assign == c)[0]) for c in range(5)}
    rep_labels = {p: 0 for p in reps.values()}
    td = construct_training_data(
        llm, hospital_tiny.dirty, "state", _clustering(assign, reps), rep_labels,
        ["city"], use_verification=False,
    )
    assert td.refined_criteria == []
    assert td.synth_rows == []
    assert td.n_evicted == 0


def test_construct_token_usage(constructed):
    _, llm = constructed
    assert llm.usage.by_purpose.get("contrastive", {}).get("prompt", 0) > 0
    assert "augmentation" in llm.usage.by_purpose


def test_max_synth_cap(hospital_tiny):
    llm = SimulatedLLM(seed=0)
    n = len(hospital_tiny.dirty)
    assign = np.zeros(n, dtype=int)
    td = construct_training_data(
        llm, hospital_tiny.dirty, "city", _clustering(assign, {0: 0}), {0: 0},
        [], max_synth=7,
    )
    assert len(td.synth_rows) <= 7
