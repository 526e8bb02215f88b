"""Unit tests for the simulated LLM's static world knowledge."""
import pytest

from repro.llm.knowledge import (
    WORLD_LEXICON,
    edit_distance_le,
    near_miss_typo,
    world_format_violation,
)


@pytest.mark.parametrize(
    "a,b,k,expected",
    [
        ("abc", "abc", 0, True),
        ("abc", "abd", 1, True),
        ("abc", "abd", 0, False),
        ("abc", "acb", 2, True),
        ("kitten", "sitting", 2, False),
        ("kitten", "sitting", 3, True),
        ("", "ab", 2, True),
        ("abcdef", "abc", 2, False),
    ],
)
def test_edit_distance_le(a, b, k, expected):
    assert edit_distance_le(a, b, k) is expected


def test_lexicon_contains_domain_words():
    for w in ("huntsville", "pneumonia", "james", "january", "brewing"):
        assert w in WORLD_LEXICON


@pytest.mark.parametrize(
    "token,expected",
    [
        ("hunttsville", True),   # near-miss of a known city
        ("pneumnia", True),      # near-miss of a known word
        ("huntsville", False),   # exact known word
        ("qzx", False),          # too short to judge
        ("zzzzzzzzzzzz", False), # nowhere near any word
    ],
)
def test_near_miss_typo(token, expected):
    assert near_miss_typo(token) is expected


@pytest.mark.parametrize(
    "attr,value,expected",
    [
        ("phone", "205-358-0167", False),
        ("phone", "2053580167", True),
        ("zip_code", "35801", False),
        ("zip_code", "3580", True),
        ("journal_issn", "1234-5678", False),
        ("journal_issn", "12345678", True),
        ("sched_dep_time", "7:10 a.m.", False),
        ("sched_dep_time", "7.10 a.m.", True),
        ("year", "1998", False),
        ("year", "19981", True),
        ("release_date", "12 june 1998", False),
        ("release_date", "12june1998", True),
        ("age", "45", False),
        ("age", "4500", True),
        ("rating_value", "7.2", False),
        ("rating_value", "720.0", True),
        ("gender", "male", False),
        ("gender", "x", True),
        ("beer_name", "whatever", False),  # no hint -> no judgment
    ],
)
def test_world_format_violation(attr, value, expected):
    assert world_format_violation(attr, value) is expected
