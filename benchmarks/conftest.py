"""Benchmark fixtures: a results directory for table-row artifacts."""
from __future__ import annotations

import json
import pathlib

import pytest

RESULTS_DIR = pathlib.Path(__file__).parent / "results"


@pytest.fixture(scope="session")
def save_rows():
    """Persist a benchmark's measured table rows as JSON next to the bench."""
    RESULTS_DIR.mkdir(exist_ok=True)

    def _save(name: str, rows) -> None:
        (RESULTS_DIR / f"{name}.json").write_text(json.dumps(rows, indent=1))

    return _save
