"""Graph ops: reversal, sampling, adjacency collection."""
from __future__ import annotations

import pytest
from pyspark.sql import functions as F

from repro.graph.generators import edges_from_list
from repro.graph.ops import (
    collect_adjacency,
    reverse_adjacency,
    reverse_edges,
    sample_vertices,
    vertices,
)


class TestReverseEdges:
    def test_reverses_pairs(self, spark):
        df = edges_from_list(spark, [(1, 2), (3, 4)])
        got = {(r["src"], r["dst"]) for r in reverse_edges(df).collect()}
        assert got == {(2, 1), (4, 3)}

    def test_double_reverse_identity(self, paper_edges):
        orig = {(r["src"], r["dst"]) for r in paper_edges.collect()}
        back = {
            (r["src"], r["dst"])
            for r in reverse_edges(reverse_edges(paper_edges)).collect()
        }
        assert orig == back

    def test_schema_preserved(self, paper_edges):
        assert reverse_edges(paper_edges).columns == ["src", "dst"]


class TestSampleVertices:
    def test_full_sample_is_identity(self, tiny_edges):
        assert sample_vertices(tiny_edges, 100).count() == tiny_edges.count()

    @pytest.mark.parametrize("pct", [20, 40, 60, 80])
    def test_monotone_in_pct(self, small_edges, pct):
        lo = sample_vertices(small_edges, pct).count()
        hi = sample_vertices(small_edges, pct + 20).count()
        assert lo <= hi

    def test_vertex_induced(self, small_edges):
        sub = sample_vertices(small_edges, 50)
        kept = {
            r["v"]
            for r in vertices(sub).collect()
        }
        full_kept = {
            r["v"]
            for r in vertices(small_edges).collect()
            if r["v"] in kept
        }
        assert kept <= full_kept

    def test_deterministic(self, small_edges):
        a = sorted(map(tuple, sample_vertices(small_edges, 40).collect()))
        b = sorted(map(tuple, sample_vertices(small_edges, 40).collect()))
        assert a == b

    def test_invalid_pct(self, tiny_edges):
        with pytest.raises(ValueError):
            sample_vertices(tiny_edges, 0)
        with pytest.raises(ValueError):
            sample_vertices(tiny_edges, 101)


class TestAdjacency:
    def test_collect_matches_edges(self, paper_edges, paper_adj):
        assert collect_adjacency(paper_edges) == paper_adj

    def test_reverse_adjacency(self, paper_adj):
        radj = reverse_adjacency(paper_adj)
        assert 0 in radj[1] and 2 in radj[1] and 5 in radj[1]
        # edge count preserved
        assert sum(map(len, radj.values())) == sum(map(len, paper_adj.values()))

    def test_sorted_neighbours(self, tiny_adj):
        for vs in tiny_adj.values():
            assert vs == sorted(vs)

    def test_vertices(self, paper_edges):
        assert vertices(paper_edges).count() == 16
