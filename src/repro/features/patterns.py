"""Three-level pattern generalization of cell values (paper §III-B).

Following the paper's example for ``"DOe123."``:

* L1 keeps symbols literal and collapses alphanumerics: ``A[6].``
* L2 distinguishes letters / digits / symbols as runs: ``L[3]D[3]S[1]``
* L3 additionally splits letter case: ``U[2]u[1]D[3]S[1]``

Patterns are run-length encodings over character classes, so two values
share a pattern iff they have the same class-run structure. Pattern
*frequency* (how many values in the attribute share a value's pattern) is
computed in :mod:`repro.features.stats`.
"""
from __future__ import annotations


def _runs(classes: list[str]) -> str:
    """Run-length encode a list of single-char class codes."""
    if not classes:
        return "<empty>"
    out = []
    prev, run = classes[0], 1
    for c in classes[1:]:
        if c == prev:
            run += 1
        else:
            out.append(f"{prev}[{run}]")
            prev, run = c, 1
    out.append(f"{prev}[{run}]")
    return "".join(out)


def l1_pattern(value: str) -> str:
    """Alphanumerics collapse to ``A`` runs; every other char stays literal."""
    if value is None or value == "":
        return "<empty>"
    out = []
    run = 0
    for ch in value:
        if ch.isalnum():
            run += 1
        else:
            if run:
                out.append(f"A[{run}]")
                run = 0
            out.append(ch)
    if run:
        out.append(f"A[{run}]")
    return "".join(out)


def l2_pattern(value: str) -> str:
    """Letters → L, digits → D, everything else → S, run-length encoded."""
    if value is None or value == "":
        return "<empty>"
    classes = ["L" if c.isalpha() else "D" if c.isdigit() else "S" for c in value]
    return _runs(classes)


def l3_pattern(value: str) -> str:
    """Like L2 but upper-case letters → U and lower-case → u."""
    if value is None or value == "":
        return "<empty>"
    classes = [
        "U" if c.isupper() else "u" if c.isalpha() else "D" if c.isdigit() else "S"
        for c in value
    ]
    return _runs(classes)


def l3_shape(value: str) -> str:
    """L3 class sequence *without* run lengths (``"DOe123."`` → ``"UuDS"``).

    Free-text attributes make exact run-length patterns near-unique (every
    word length differs), so shape-level generalization is what rare-format
    checks use there; exact L2/L3 patterns stay in use for structured
    attributes (codes, dates, phone numbers).
    """
    if value is None or value == "":
        return "<empty>"
    classes = [
        "U" if c.isupper() else "u" if c.isalpha() else "D" if c.isdigit() else "S"
        for c in value
    ]
    out = [classes[0]]
    for c in classes[1:]:
        if c != out[-1]:
            out.append(c)
    return "".join(out)


PATTERN_LEVELS = {
    "l1": l1_pattern,
    "l2": l2_pattern,
    "l3": l3_pattern,
    "shape3": l3_shape,
}
