"""Error-injection engine — substitute for BART / BigDaMa error-generator.

Injects the paper's five error types into a clean table at configurable
rates (paper §II, Table II):

* ``MV`` missing values — explicit/implicit placeholders,
* ``T``  typos — character-level edits within edit distance <= 2,
* ``PV`` pattern violations — format rewrites that change the value's
  L3 pattern (separators stripped, case mangled, reordered formats),
* ``O``  outliers — numeric values pushed far outside the distribution,
  or a rare token for non-numeric attributes,
* ``RV`` rule violations — the RHS of a functional dependency replaced by
  a *valid* value from a different LHS group, so the cell looks clean in
  isolation and is only detectable across attributes.

Injection is deterministic in the seed, cells are disjoint across types,
and every injected value is guaranteed to differ from the clean value.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

MISSING_PLACEHOLDERS = ["", "null", "n/a", "-", "unknown"]
ERROR_TYPES = ("MV", "T", "PV", "O", "RV")


def _typo(g: np.random.Generator, v: str) -> str:
    """One or two character-level edits (sub/insert/delete/transpose)."""
    chars = list(v) if v else list("x")
    alphabet = "abcdefghijklmnopqrstuvwxyz0123456789"
    for _ in range(int(g.integers(1, 3))):
        op = g.choice(["sub", "ins", "del", "swap"])
        i = int(g.integers(0, len(chars)))
        if op == "sub":
            chars[i] = alphabet[int(g.integers(0, len(alphabet)))]
        elif op == "ins":
            chars.insert(i, alphabet[int(g.integers(0, len(alphabet)))])
        elif op == "del" and len(chars) > 1:
            chars.pop(i)
        elif op == "swap" and len(chars) > 1:
            j = min(i, len(chars) - 2)
            chars[j], chars[j + 1] = chars[j + 1], chars[j]
    return "".join(chars)


def _pattern_violation(g: np.random.Generator, v: str) -> str:
    """Rewrite the value's format without changing its 'meaning'."""
    transforms = [
        lambda s: "".join(c for c in s if c.isalnum()),   # strip separators
        lambda s: s.upper(),                               # case mangle up
        lambda s: s.title().replace(" ", ""),              # CamelCase squash
        lambda s: s.replace("-", "/").replace(":", "."),   # separator swap
        lambda s: f" {s} ",                                # stray whitespace
        lambda s: s[::-1] if s.isdigit() else s.capitalize(),
    ]
    order = g.permutation(len(transforms))
    for k in order:
        out = transforms[int(k)](v)
        if out != v:
            return out
    return v + "_"


def _outlier(g: np.random.Generator, v: str, numeric: bool) -> str:
    if numeric:
        try:
            x = float(v)
            factor = float(g.choice([100.0, 1000.0, -10.0]))
            out = x * factor if x != 0 else factor
            return f"{out:.1f}" if "." in v else f"{int(out)}"
        except ValueError:
            pass
    # rare-token outlier for non-numeric attributes (<1 % frequency)
    return "zz" + "".join(g.choice(list("qxjvkw"), 3))


def _eligible(attr: str, etype: str, meta: dict) -> bool:
    if etype == "O":
        return True  # preference for numeric attrs handled by weighting
    if etype == "RV":
        return attr in {rhs for _, rhs in meta.get("fds", [])}
    return True


def inject_errors(
    clean: pd.DataFrame,
    meta: dict,
    *,
    error_rate: float,
    type_weights: dict[str, float],
    seed: int = 0,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Return ``(dirty, error_types)`` with ~``error_rate`` of cells corrupted.

    ``type_weights`` distributes the error budget over the five types;
    types with no eligible attribute (e.g. RV with no FDs) are dropped and
    their budget is redistributed proportionally.
    """
    g = np.random.default_rng(seed)
    n, attrs = len(clean), list(clean.columns)
    n_cells = n * len(attrs)
    budget = int(round(error_rate * n_cells))
    dirty = clean.copy()
    etypes = pd.DataFrame("", index=clean.index, columns=attrs)

    weights = {
        t: w for t, w in type_weights.items()
        if w > 0 and any(_eligible(a, t, meta) for a in attrs)
    }
    total_w = sum(weights.values())
    if not total_w or not budget:
        return dirty, etypes
    counts = {t: int(round(budget * w / total_w)) for t, w in weights.items()}

    used: set[tuple[int, str]] = set()
    numeric = set(meta.get("numeric_attrs", []))
    fd_rhs_to_lhs: dict[str, list[str]] = {}
    for lhs, rhs in meta.get("fds", []):
        fd_rhs_to_lhs.setdefault(rhs, []).append(lhs)

    for etype in ERROR_TYPES:
        k = counts.get(etype, 0)
        if not k:
            continue
        cand_attrs = [a for a in attrs if _eligible(a, etype, meta)]
        if etype == "O" and numeric:
            cand_attrs = [a for a in attrs if a in numeric] or cand_attrs
        if etype == "PV" and meta.get("patterns"):
            patterned = [a for a in cand_attrs if a in meta["patterns"]]
            cand_attrs = patterned or cand_attrs
        done, attempts = 0, 0
        while done < k and attempts < 50 * k + 100:
            attempts += 1
            a = cand_attrs[int(g.integers(0, len(cand_attrs)))]
            i = int(g.integers(0, n))
            if (i, a) in used:
                continue
            old = clean.iat[i, attrs.index(a)]
            if etype == "MV":
                new = str(g.choice(MISSING_PLACEHOLDERS))
            elif etype == "T":
                new = _typo(g, old)
            elif etype == "PV":
                new = _pattern_violation(g, old)
            elif etype == "O":
                new = _outlier(g, old, a in numeric)
            else:  # RV: valid-but-inconsistent value from another FD group
                lhs = fd_rhs_to_lhs[a][int(g.integers(0, len(fd_rhs_to_lhs[a])))]
                lhs_val = clean.iat[i, attrs.index(lhs)]
                others = clean.loc[clean[lhs] != lhs_val, a].unique()
                others = [o for o in others if o != old]
                if not others:
                    continue
                new = str(others[int(g.integers(0, len(others)))])
            if new == old:
                continue
            dirty.iat[i, attrs.index(a)] = new
            etypes.iat[i, attrs.index(a)] = etype
            used.add((i, a))
            done += 1
    return dirty, etypes
