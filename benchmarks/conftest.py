"""Benchmark-local fixtures: a results/ directory for the emitted tables."""
from __future__ import annotations

import pathlib

import pytest

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "results"


@pytest.fixture(scope="session")
def results_dir() -> pathlib.Path:
    RESULTS.mkdir(exist_ok=True)
    return RESULTS


@pytest.fixture(scope="session")
def emit(results_dir):
    """Write an experiment's rows to results/<name>.md (and echo them)."""
    from repro.harness.experiments import to_markdown

    def _emit(name: str, title: str, df):
        md = f"## {title}\n\n{to_markdown(df)}\n"
        (results_dir / f"{name}.md").write_text(md)
        print(f"\n{md}")
        return df

    return _emit
