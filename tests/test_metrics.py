"""Tests for cell-level precision/recall/F1."""
import pandas as pd
import pytest

from repro.core.metrics import prf


def _m(rows):
    return pd.DataFrame(rows)


def test_perfect():
    t = _m({"a": [True, False], "b": [False, True]})
    out = prf(t, t)
    assert out["prec"] == out["rec"] == out["f1"] == 1.0


def test_all_clean_prediction():
    pred = _m({"a": [False, False]})
    truth = _m({"a": [True, False]})
    out = prf(pred, truth)
    assert out["prec"] == 0.0 and out["rec"] == 0.0 and out["f1"] == 0.0


def test_half_precision():
    pred = _m({"a": [True, True]})
    truth = _m({"a": [True, False]})
    out = prf(pred, truth)
    assert out["prec"] == 0.5 and out["rec"] == 1.0
    assert out["f1"] == pytest.approx(2 / 3)


def test_counts():
    pred = _m({"a": [True, True, False, False]})
    truth = _m({"a": [True, False, True, False]})
    out = prf(pred, truth)
    assert (out["tp"], out["fp"], out["fn"]) == (1, 1, 1)


def test_column_alignment():
    pred = _m({"b": [True], "a": [False]})
    truth = _m({"a": [False], "b": [True]})
    assert prf(pred, truth)["f1"] == 1.0


def test_shape_mismatch_raises():
    with pytest.raises(ValueError):
        prf(_m({"a": [True]}), _m({"a": [True, False]}))


def test_no_errors_no_predictions():
    out = prf(_m({"a": [False]}), _m({"a": [False]}))
    assert out["f1"] == 0.0  # degenerate but defined
