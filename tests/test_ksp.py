"""Adapted KSP baselines (Exp-6): correct results, no index pruning."""
from __future__ import annotations

import pytest

from repro.baselines.ksp import run_dksp, run_onepass
from repro.core import ref_engine as ref
from repro.core.basic_enum import run_basic
from repro.core.queries import Query

PAPER_Q = [Query(0, 0, 11, 5), Query(1, 4, 14, 4), Query(2, 9, 14, 3)]


@pytest.fixture(scope="module")
def runs(spark, paper_edges):
    return {
        "dksp": run_dksp(spark, paper_edges, PAPER_Q),
        "onepass": run_onepass(spark, paper_edges, PAPER_Q),
        "basic": run_basic(spark, paper_edges, PAPER_Q),
    }


def by_query(rr):
    out = {q.qid: set() for q in PAPER_Q}
    for r in rr.results.collect():
        out[r["qid"]].add(tuple(r["path"]))
    return out


class TestKspBaselines:
    @pytest.mark.parametrize("name", ["dksp", "onepass"])
    def test_correct_results(self, runs, paper_adj, name):
        got = by_query(runs[name])
        for q in PAPER_Q:
            assert got[q.qid] == ref.enum_st_paths(paper_adj, q.s, q.t, q.k), q

    @pytest.mark.parametrize("name", ["dksp", "onepass"])
    def test_more_work_than_pruned(self, runs, name):
        """The whole point of Exp-6: without HC-specific pruning the
        adapted KSP algorithms explore strictly more than PathEnum-style
        enumeration."""
        assert runs[name].stats.expanded_rows > runs["basic"].stats.expanded_rows

    def test_onepass_explores_most(self, runs):
        # forward-only expansion cannot benefit from the bidirectional cut
        assert runs["onepass"].stats.expanded_rows >= runs["dksp"].stats.expanded_rows

    def test_infeasible_query_yields_nothing(self, spark, paper_edges):
        # dist(v0, v11) = 5 > k = 4: even the unpruned searches join to ∅.
        rr = run_dksp(spark, paper_edges, [Query(0, 0, 11, 4)])
        assert rr.extras["n_paths"] == 0

    def test_timings_enumeration_only(self, runs):
        assert set(runs["dksp"].timings) == {"enumeration"}
