"""Multi-source BFS index: against the reference BFS and the DuckDB oracle."""
from __future__ import annotations

import pytest
from pyspark.sql import functions as F

from repro.core import ref_engine as ref
from repro.core.index import collect_dists, index_counts, multi_source_bfs
from repro.graph.ops import reverse_edges
from repro.oracle import assert_equivalent
from tests.sqlgen import dists_sql


class TestMultiSourceBfs:
    def test_paper_graph_single_root_oracle(self, spark, paper_edges, paper_pdf):
        got = multi_source_bfs(spark, paper_edges, [0], 5).select(
            "root", "v", F.col("dist").cast("int").alias("dist")
        )
        assert_equivalent(got, dists_sql([0], 5), edges=paper_pdf)

    def test_paper_graph_multi_root_oracle(self, spark, paper_edges, paper_pdf):
        roots = [0, 2, 5, 4, 9]
        got = multi_source_bfs(spark, paper_edges, roots, 5).select(
            "root", "v", F.col("dist").cast("int").alias("dist")
        )
        assert_equivalent(got, dists_sql(roots, 5), edges=paper_pdf)

    def test_reverse_graph_oracle(self, spark, paper_edges, paper_pdf):
        got = multi_source_bfs(
            spark, reverse_edges(paper_edges), [11, 13, 12, 14], 5
        ).select("root", "v", F.col("dist").cast("int").alias("dist"))
        rev_pdf = paper_pdf.rename(columns={"src": "dst", "dst": "src"})[
            ["src", "dst"]
        ]
        assert_equivalent(got, dists_sql([11, 12, 13, 14], 5), edges=rev_pdf)

    def test_tiny_graph_matches_ref(self, spark, tiny_edges, tiny_adj):
        roots = sorted(tiny_adj)[:8]
        got = collect_dists(multi_source_bfs(spark, tiny_edges, roots, 4))
        for r in roots:
            assert got.get(r, {}) == ref.bfs_dists(tiny_adj, r, 4), r

    @pytest.mark.parametrize("k_max", [0, 1, 2, 3])
    def test_k_cap_respected(self, spark, paper_edges, k_max):
        idx = multi_source_bfs(spark, paper_edges, [0], k_max)
        assert idx.agg(F.max("dist")).collect()[0][0] <= k_max

    def test_duplicate_roots_deduped(self, spark, paper_edges):
        a = multi_source_bfs(spark, paper_edges, [0, 0, 0], 3).count()
        b = multi_source_bfs(spark, paper_edges, [0], 3).count()
        assert a == b

    def test_empty_roots(self, spark, paper_edges):
        assert multi_source_bfs(spark, paper_edges, [], 3).count() == 0

    def test_root_with_no_outedges(self, spark, paper_edges):
        # v14 is a sink: only the dist-0 self row.
        idx = multi_source_bfs(spark, paper_edges, [14], 5)
        assert [(r["v"], r["dist"]) for r in idx.collect()] == [(14, 0)]

    def test_min_distance_kept(self, spark, paper_edges, paper_adj):
        # v6 reachable from 0 at 4 (0-4-9-3-6) and 5 (0-4-9-3-15... ) — BFS
        # must record 4.
        got = collect_dists(multi_source_bfs(spark, paper_edges, [0], 5))
        assert got[0][6] == ref.bfs_dists(paper_adj, 0, 5)[6] == 4


class TestIndexCounts:
    def test_counts_sum_to_rows(self, spark, paper_edges):
        idx = multi_source_bfs(spark, paper_edges, [0, 2], 5)
        counts = index_counts(idx)
        assert sum(sum(d.values()) for d in counts.values()) == idx.count()

    def test_dist_zero_is_one(self, spark, paper_edges):
        counts = index_counts(multi_source_bfs(spark, paper_edges, [0], 5))
        assert counts[0][0] == 1

    def test_paper_frontiers_from_v0(self, spark, paper_edges):
        counts = index_counts(multi_source_bfs(spark, paper_edges, [0], 5))
        # 0 -> {1,4} -> {7,8,9} -> {10,3,15} -> {12,6} -> {11,13,14}
        assert counts[0] == {0: 1, 1: 2, 2: 3, 3: 3, 4: 2, 5: 3}


class TestCollectDists:
    def test_round_trip(self, spark, paper_edges):
        idx = multi_source_bfs(spark, paper_edges, [0, 4], 4)
        d = collect_dists(idx)
        assert set(d) == {0, 4}
        assert d[4][14] == 4 and d[0][0] == 0
