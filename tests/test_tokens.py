"""Unit tests for token accounting."""
from repro.llm.tokens import Usage, count_tokens


def test_count_tokens_empty():
    assert count_tokens("") == 0


def test_count_tokens_short():
    assert count_tokens("ab") == 1


def test_count_tokens_scales_with_length():
    assert count_tokens("x" * 400) == 100


def test_usage_charge():
    u = Usage()
    u.charge("p" * 40, "c" * 8, "labeling")
    assert u.prompt_tokens == 10
    assert u.completion_tokens == 2
    assert u.calls == 1
    assert u.total_tokens == 12
    assert u.by_purpose["labeling"] == {"prompt": 10, "completion": 2}


def test_usage_merge():
    a, b = Usage(), Usage()
    a.charge("x" * 4, "y" * 4, "criteria")
    b.charge("x" * 8, "y" * 8, "criteria")
    b.charge("x" * 4, "", "guideline")
    a.merge(b)
    assert a.calls == 3
    assert a.by_purpose["criteria"]["prompt"] == 3
    assert "guideline" in a.by_purpose


def test_usage_merge_keeps_other_intact():
    a, b = Usage(), Usage()
    b.charge("xxxx", "yyyy", "p")
    a.merge(b)
    assert b.prompt_tokens == 1 and a.prompt_tokens == 1
