"""Benchmark-suite fixtures: one Spark session + a results sink.

Each benchmark writes its experiment result to ``results/<name>.json`` and
a paper-style text table to ``results/<name>.txt`` so EXPERIMENTS.md can
be updated from a reproducible artifact (pytest captures stdout).
"""
import json
from pathlib import Path

import pytest

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"


@pytest.fixture(scope="session")
def results_dir() -> Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    return RESULTS_DIR


@pytest.fixture(scope="session")
def save_result(results_dir):
    from repro.experiments import format_rows

    def _save(result: dict) -> str:
        name = result["experiment"]
        (results_dir / f"{name}.json").write_text(json.dumps(result, indent=2))
        text = format_rows(result)
        (results_dir / f"{name}.txt").write_text(text + "\n")
        print("\n" + text)
        return text

    return _save
