"""Graph-level DataFrame operations shared by all algorithms."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def reverse_edges(edges: DataFrame) -> DataFrame:
    """The reverse graph ``G_r``: every edge (u, v) becomes (v, u)."""
    return edges.select(
        F.col("dst").alias("src"), F.col("src").alias("dst")
    )


def sample_vertices(edges: DataFrame, pct: int) -> DataFrame:
    """Vertex-induced subgraph on a deterministic ``pct``% vertex sample.

    Used by Exp-5 (scalability): the paper samples 20%..100% of the two
    largest graphs. A vertex is kept iff ``hash(v) mod 100 < pct``; an edge
    is kept iff both endpoints are kept, matching vertex-induced sampling.
    """
    if not 0 < pct <= 100:
        raise ValueError(f"pct must be in (0, 100], got {pct}")
    if pct == 100:
        return edges
    keep = lambda c: F.pmod(F.xxhash64(F.col(c)), F.lit(100)) < pct  # noqa: E731
    return edges.where(keep("src") & keep("dst"))


def collect_adjacency(edges: DataFrame) -> dict[int, list[int]]:
    """Out-adjacency as a driver-side dict ``{u: [v, ...]}``.

    Used by the driver-resident pieces (query generation over random walks,
    Alg 3 detection) — these are metadata-sized relative to enumeration, per
    DESIGN.md §2. Neighbour lists are sorted for determinism.
    """
    pdf: pd.DataFrame = edges.toPandas()
    adj: dict[int, list[int]] = {}
    for u, v in zip(pdf["src"].tolist(), pdf["dst"].tolist()):
        adj.setdefault(u, []).append(v)
    return {u: sorted(vs) for u, vs in adj.items()}


def reverse_adjacency(adj: dict[int, list[int]]) -> dict[int, list[int]]:
    """Driver-side reverse of :func:`collect_adjacency` output."""
    radj: dict[int, list[int]] = {}
    for u, vs in adj.items():
        for v in vs:
            radj.setdefault(v, []).append(u)
    return {u: sorted(vs) for u, vs in radj.items()}


def vertices(edges: DataFrame) -> DataFrame:
    """Distinct vertices incident to at least one edge, column ``v``."""
    return (
        edges.select(F.col("src").alias("v"))
        .unionAll(edges.select(F.col("dst").alias("v")))
        .distinct()
    )
