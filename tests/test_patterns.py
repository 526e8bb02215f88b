"""Unit tests for the three-level pattern generalization (+ shapes)."""
import pytest

from repro.features.patterns import (
    PATTERN_LEVELS,
    l1_pattern,
    l2_pattern,
    l3_pattern,
    l3_shape,
)


@pytest.mark.parametrize(
    "value,expected",
    [
        ("DOe123.", "A[6]."),
        ("abc", "A[3]"),
        ("a-b", "A[1]-A[1]"),
        ("12 34", "A[2] A[2]"),
        ("...", "..."),
        ("", "<empty>"),
    ],
)
def test_l1(value, expected):
    assert l1_pattern(value) == expected


@pytest.mark.parametrize(
    "value,expected",
    [
        ("DOe123.", "L[3]D[3]S[1]"),
        ("abc", "L[3]"),
        ("007", "D[3]"),
        ("a1b2", "L[1]D[1]L[1]D[1]"),
        ("7:10 a.m.", "D[1]S[1]D[2]S[1]L[1]S[1]L[1]S[1]"),
        ("", "<empty>"),
    ],
)
def test_l2(value, expected):
    assert l2_pattern(value) == expected


@pytest.mark.parametrize(
    "value,expected",
    [
        ("DOe123.", "U[2]u[1]D[3]S[1]"),
        ("Abc", "U[1]u[2]"),
        ("ABC", "U[3]"),
        ("ab1", "u[2]D[1]"),
        ("", "<empty>"),
    ],
)
def test_l3(value, expected):
    assert l3_pattern(value) == expected


@pytest.mark.parametrize(
    "value,expected",
    [
        ("DOe123.", "UuDS"),
        ("birmingham medical center", "uSuSu"),
        ("BIRMINGHAM MEDICAL CENTER", "USUSU"),
        ("BirminghamMedicalCenter", "UuUuUu"),
        ("85%", "DS"),
        ("85", "D"),
        ("", "<empty>"),
    ],
)
def test_l3_shape(value, expected):
    assert l3_shape(value) == expected


def test_same_structure_same_pattern():
    assert l2_pattern("12.0") == l2_pattern("16.0")
    assert l3_shape("7:10 a.m.") == l3_shape("9:25 p.m.")


def test_levels_registry_complete():
    assert set(PATTERN_LEVELS) == {"l1", "l2", "l3", "shape3"}
    for fn in PATTERN_LEVELS.values():
        assert fn("x1.") != ""


@pytest.mark.parametrize("value", ["abc", "A1.", "  ", "ü+1", "NULL"])
def test_patterns_total_functions(value):
    # every level maps every string to a non-empty pattern
    for fn in PATTERN_LEVELS.values():
        assert isinstance(fn(value), str) and fn(value)
