"""Shared fixtures: small graphs (as Spark edges, pandas frames, and driver
adjacency) reused across the test modules. Session-scoped where the data is
immutable so Spark-side generation happens once."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.graph.generators import (
    DATASETS,
    PAPER_EXAMPLE_PAIRS,
    paper_example_edges,
    powerlaw_edges,
    edges_from_pandas,
)
from repro.graph.ops import collect_adjacency, reverse_adjacency


@pytest.fixture(scope="session")
def paper_edges(spark):
    """The paper's Fig. 1 running-example graph."""
    return paper_example_edges(spark).cache()


@pytest.fixture(scope="session")
def paper_pdf() -> pd.DataFrame:
    return pd.DataFrame(PAPER_EXAMPLE_PAIRS, columns=["src", "dst"]).astype("int64")


@pytest.fixture(scope="session")
def paper_adj(paper_pdf):
    adj: dict[int, list[int]] = {}
    for u, v in paper_pdf.itertuples(index=False):
        adj.setdefault(int(u), []).append(int(v))
    return {u: sorted(vs) for u, vs in adj.items()}


@pytest.fixture(scope="session")
def paper_radj(paper_adj):
    return reverse_adjacency(paper_adj)


@pytest.fixture(scope="session")
def tiny_pdf() -> pd.DataFrame:
    return powerlaw_edges(DATASETS["TINY"])


@pytest.fixture(scope="session")
def tiny_edges(spark, tiny_pdf):
    return edges_from_pandas(spark, tiny_pdf).cache()


@pytest.fixture(scope="session")
def tiny_adj(tiny_edges):
    return collect_adjacency(tiny_edges)


@pytest.fixture(scope="session")
def tiny_radj(tiny_adj):
    return reverse_adjacency(tiny_adj)


@pytest.fixture(scope="session")
def small_pdf() -> pd.DataFrame:
    return powerlaw_edges(DATASETS["SMALL"])


@pytest.fixture(scope="session")
def small_edges(spark, small_pdf):
    return edges_from_pandas(spark, small_pdf).cache()


@pytest.fixture(scope="session")
def small_adj(small_edges):
    return collect_adjacency(small_edges)


@pytest.fixture(scope="session")
def small_radj(small_adj):
    return reverse_adjacency(small_adj)
