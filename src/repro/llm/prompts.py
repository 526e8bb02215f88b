"""Prompt templates and tuple serialization (paper §III-B).

Tuples are serialized as attribute-value pair strings exactly as in the
paper: ``{a1: v1, a2: v2, ...}`` with NULLs as empty strings. Each ZeroED
LLM purpose has a template; the rendered text is what the token accountant
charges, so prompt sizes scale the way the paper's do (criteria/guideline
prompts carry a handful of sample tuples; labeling prompts carry batches
of 20; FM_ED carries every tuple of the dataset).
"""
from __future__ import annotations

ERROR_DESCRIPTIONS = (
    "Common error types: (1) missing values: empty fields or null "
    "placeholders; (2) typos: misspellings or character substitutions; "
    "(3) pattern violations: values not conforming to the attribute's "
    "expected format; (4) outliers: values far outside the attribute's "
    "distribution or domain; (5) rule violations: inconsistencies between "
    "related attributes, e.g. a capital city wrong for its country."
)


def serialize_tuple(row: dict[str, str]) -> str:
    """``{a1: v1, a2: v2, ...}`` with missing values as empty strings."""
    inner = ", ".join(f"{a}: {'' if v is None else v}" for a, v in row.items())
    return "{" + inner + "}"


def serialize_tuples(rows: list[dict[str, str]]) -> str:
    return "\n".join(serialize_tuple(r) for r in rows)


def criteria_prompt(attr: str, sample_rows: list[dict]) -> str:
    return (
        "You are a data quality expert. Given sample tuples from a dirty "
        f"table, write executable Python error-checking functions for "
        f"attribute '{attr}' covering all plausible error causes "
        "(missingness, format, domain, range, cross-attribute consistency). "
        f"{ERROR_DESCRIPTIONS}\nSample tuples:\n{serialize_tuples(sample_rows)}\n"
        "Return a list of functions def check_x(row) -> bool (True = clean)."
    )


def analysis_fn_prompt(attr: str, sample_rows: list[dict]) -> str:
    return (
        "You are a data analyst. Design Python analysis functions that "
        f"parse the entire dataset and extract the key distributions of "
        f"attribute '{attr}' relevant for error detection: common and rare "
        "values, format patterns, numeric summaries, null rates, and "
        "dependencies with related attributes.\nSample tuples:\n"
        f"{serialize_tuples(sample_rows)}\nReturn function code."
    )


def guideline_prompt(attr: str, distribution_report: str, sample_rows: list[dict]) -> str:
    return (
        "You are a data quality expert. Using the distribution analysis "
        f"results for attribute '{attr}' and the sample tuples, write a "
        "detailed error-detection guideline with error examples, causes, "
        f"and detection methods for each error type. {ERROR_DESCRIPTIONS}\n"
        f"Distribution analysis results:\n{distribution_report}\n"
        f"Sample tuples:\n{serialize_tuples(sample_rows)}"
    )


def labeling_prompt(attr: str, guideline_text: str, batch_rows: list[dict]) -> str:
    return (
        f"Following the detection guideline for attribute '{attr}', label "
        "each value below as 1 (error) or 0 (clean). Consider the "
        "correlated attribute values provided as context.\nGuideline:\n"
        f"{guideline_text}\nValues to label:\n{serialize_tuples(batch_rows)}"
    )


def contrastive_prompt(attr: str, error_values: list[str], clean_values: list[str]) -> str:
    return (
        f"For attribute '{attr}', here are values labeled ERRONEOUS:\n"
        + "\n".join(error_values[:40])
        + "\nand values labeled CLEAN:\n"
        + "\n".join(clean_values[:40])
        + "\nContrast the two groups and emit refined executable "
        "error-checking functions capturing what distinguishes them."
    )


def augmentation_prompt(attr: str, clean_values: list[str], n: int) -> str:
    return (
        f"Generate {n} realistic erroneous variants of the following clean "
        f"values of attribute '{attr}', reflecting typos, missing values, "
        "format violations, outliers and cross-attribute inconsistencies "
        "while staying semantically plausible:\n" + "\n".join(clean_values[:40])
    )


def fm_ed_prompt(row: dict[str, str]) -> str:
    """FM_ED's per-tuple zero-shot query (Narayan et al. style)."""
    return (
        f"Is there an error in this tuple?\n{serialize_tuple(row)}\n"
        "Answer per attribute with yes/no."
    )
