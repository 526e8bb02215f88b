"""Tests for the error-injection engine."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets.schemas import GENERATORS
from repro.errors.inject import MISSING_PLACEHOLDERS, inject_errors
from repro.features.patterns import l3_shape
from repro.llm.knowledge import edit_distance_le


@pytest.fixture(scope="module")
def hospital_clean():
    return GENERATORS["hospital"](250, seed=0)


def _inject(clean, meta, **kw):
    defaults = dict(error_rate=0.08, type_weights={"MV": 1, "T": 1, "PV": 1, "O": 1, "RV": 1}, seed=5)
    defaults.update(kw)
    return inject_errors(clean, meta, **defaults)


def test_total_rate(hospital_clean):
    clean, meta = hospital_clean
    dirty, types = _inject(clean, meta)
    rate = (dirty != clean).to_numpy().mean()
    assert abs(rate - 0.08) < 0.01


def test_all_marked_cells_differ(hospital_clean):
    clean, meta = hospital_clean
    dirty, types = _inject(clean, meta)
    marked = (types != "").to_numpy()
    differs = (dirty != clean).to_numpy()
    assert (marked == differs).all()


def test_mv_values_are_placeholders(hospital_clean):
    clean, meta = hospital_clean
    dirty, types = _inject(clean, meta)
    mv = types.to_numpy() == "MV"
    vals = dirty.to_numpy()[mv]
    assert len(vals) > 0
    assert all(v in MISSING_PLACEHOLDERS for v in vals)


def test_typos_are_small_edits(hospital_clean):
    clean, meta = hospital_clean
    dirty, types = _inject(clean, meta)
    t = np.argwhere(types.to_numpy() == "T")
    assert len(t) > 0
    for i, j in t[:30]:
        assert edit_distance_le(dirty.iat[i, j], clean.iat[i, j], 2)


def test_pattern_violations_change_shape_or_chars(hospital_clean):
    clean, meta = hospital_clean
    dirty, types = _inject(clean, meta)
    pv = np.argwhere(types.to_numpy() == "PV")
    assert len(pv) > 0
    for i, j in pv[:30]:
        assert dirty.iat[i, j] != clean.iat[i, j]


def test_outliers_prefer_numeric_and_are_far(hospital_clean):
    clean, meta = hospital_clean
    dirty, types = _inject(clean, meta)
    o = np.argwhere(types.to_numpy() == "O")
    assert len(o) > 0
    numeric_cols = {clean.columns.get_loc(a) for a in meta["numeric_attrs"]}
    for i, j in o:
        assert j in numeric_cols
        assert abs(float(dirty.iat[i, j])) >= 10 * abs(float(clean.iat[i, j]))


def test_rv_values_look_valid_but_violate_fd(hospital_clean):
    clean, meta = hospital_clean
    dirty, types = _inject(clean, meta)
    rv = np.argwhere(types.to_numpy() == "RV")
    assert len(rv) > 0
    fd_rhs = {rhs for _, rhs in meta["fds"]}
    for i, j in rv[:30]:
        attr = clean.columns[j]
        assert attr in fd_rhs
        # the injected value is drawn from the attribute's clean domain
        assert dirty.iat[i, j] in set(clean[attr])


def test_rv_shape_is_valid(hospital_clean):
    # a rule violation must be invisible to single-cell shape checks
    clean, meta = hospital_clean
    dirty, types = _inject(clean, meta)
    rv = np.argwhere(types.to_numpy() == "RV")
    clean_shapes = {a: {l3_shape(v) for v in clean[a]} for a in clean.columns}
    for i, j in rv[:30]:
        assert l3_shape(dirty.iat[i, j]) in clean_shapes[clean.columns[j]]


def test_deterministic(hospital_clean):
    clean, meta = hospital_clean
    d1, t1 = _inject(clean, meta)
    d2, t2 = _inject(clean, meta)
    pd.testing.assert_frame_equal(d1, d2)
    pd.testing.assert_frame_equal(t1, t2)


def test_zero_rate_is_identity(hospital_clean):
    clean, meta = hospital_clean
    dirty, types = _inject(clean, meta, error_rate=0.0)
    pd.testing.assert_frame_equal(dirty, clean)
    assert (types == "").all().all()


def test_rv_dropped_without_fds(hospital_clean):
    clean, meta = hospital_clean
    meta2 = dict(meta, fds=[])
    dirty, types = _inject(clean, meta2, type_weights={"RV": 1, "T": 1})
    assert (types.to_numpy() == "RV").sum() == 0
    assert (types.to_numpy() == "T").sum() > 0


def test_weights_shape_distribution(hospital_clean):
    clean, meta = hospital_clean
    _, types = _inject(clean, meta, type_weights={"MV": 3, "T": 1, "PV": 0, "O": 0, "RV": 0})
    flat = types.to_numpy().ravel()
    assert (flat == "MV").sum() > (flat == "T").sum()
    assert (flat == "PV").sum() == 0
