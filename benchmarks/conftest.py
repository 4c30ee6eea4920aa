"""Benchmark fixtures: dataset indexes are generated once per session and a
results directory collects the formatted paper-style tables."""
from __future__ import annotations

from pathlib import Path

import pytest

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"


@pytest.fixture(scope="session")
def results_dir() -> Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    return RESULTS_DIR


@pytest.fixture(scope="session")
def dataset_index():
    """Factory: cached TemporalBipartiteIndex per (dataset, sf)."""
    from repro.experiments import datasets
    from repro.graph.index import TemporalBipartiteIndex

    cache = {}

    def get(name: str, sf: float = 1.0):
        key = (name, sf)
        if key not in cache:
            cache[key] = TemporalBipartiteIndex.from_pandas(
                datasets.load(name, sf=sf)
            )
        return cache[key]

    return get
