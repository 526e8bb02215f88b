"""Tests for NMI attribute correlation."""
import pytest

from repro.features.correlation import entropy, nmi, nmi_matrix, top_related


def test_entropy_uniform_vs_constant():
    assert entropy({"a": 5, "b": 5}) > entropy({"a": 10}) == 0.0


def test_entropy_empty():
    assert entropy({}) == 0.0


def test_nmi_bounds(hospital_stats):
    for a in hospital_stats.attrs[:5]:
        for b in hospital_stats.attrs[:5]:
            if a != b:
                assert 0.0 <= nmi(hospital_stats, a, b) <= 1.0 + 1e-9


def test_nmi_symmetric(hospital_stats):
    assert nmi(hospital_stats, "city", "state") == pytest.approx(
        nmi(hospital_stats, "state", "city")
    )


def test_fd_pairs_score_high(hospital_stats):
    # city -> state is a real dependency; city vs score is noise
    assert nmi(hospital_stats, "city", "state") > nmi(hospital_stats, "city", "score")


def test_nmi_matrix_complete(hospital_stats):
    m = nmi_matrix(hospital_stats)
    k = len(hospital_stats.attrs)
    assert len(m) == k * (k - 1)


def test_top_related_k(hospital_stats):
    rel = top_related(hospital_stats, 2)
    for a, others in rel.items():
        assert len(others) == 2
        assert a not in others


def test_top_related_zero(hospital_stats):
    rel = top_related(hospital_stats, 0)
    assert all(v == [] for v in rel.values())


def test_top_related_picks_dependency_partner(hospital_stats):
    # measure_name is determined by measure_code; it must rank top-2
    assert "measure_code" in top_related(hospital_stats, 2)["measure_name"]
