"""DetectCommonQuery (Algorithm 3) / Ψ structure tests — driver-side."""
from __future__ import annotations

import pytest

from repro.core import ref_engine as ref
from repro.core.queries import Query
from repro.core.sharing import (
    build_basic_plan,
    build_shared_plan,
    default_split,
    optimized_split,
)
from repro.graph.ops import reverse_adjacency

PAPER_Q = [
    Query(0, 0, 11, 5),
    Query(1, 2, 13, 5),
    Query(2, 5, 12, 5),
    Query(3, 4, 14, 4),
    Query(4, 9, 14, 3),
]
PAPER_CLUSTERS = [[0, 1, 2], [3, 4]]


def dist_maps(adj, roots, k):
    return {r: ref.bfs_dists(adj, r, k) for r in roots}


@pytest.fixture(scope="module")
def paper_plan(paper_adj, paper_radj):
    splits = {q.qid: default_split(q) for q in PAPER_Q}
    dist_from_s = dist_maps(paper_adj, [q.s for q in PAPER_Q], 5)
    dist_to_t = dist_maps(paper_radj, [q.t for q in PAPER_Q], 5)
    return build_shared_plan(
        PAPER_Q, PAPER_CLUSTERS, splits, paper_adj, paper_radj,
        dist_from_s, dist_to_t,
    )


class TestSplits:
    @pytest.mark.parametrize("k,a", [(1, 1), (2, 1), (3, 2), (4, 2), (5, 3), (7, 4)])
    def test_default_split_is_ceil_half(self, k, a):
        assert default_split(Query(0, 1, 2, k)) == a

    def test_optimized_split_bounds(self):
        q = Query(0, 1, 2, 5)
        counts = {1: {0: 1, 1: 10, 2: 100}, 2: {0: 1, 1: 2, 2: 4}}
        a = optimized_split(q, counts, counts)
        assert 1 <= a <= q.k - 1

    def test_optimized_split_prefers_cheap_side(self):
        # forward explodes, backward tiny -> backward takes the extra hop,
        # within the balanced ±1 candidate window
        q = Query(0, 1, 2, 6)
        f = {1: {i: 10**i for i in range(7)}}
        b = {2: {i: 1 for i in range(7)}}
        assert optimized_split(q, f, b) == 2

    def test_optimized_split_symmetric_case(self):
        q = Query(0, 1, 2, 6)
        f = {1: {i: 5 for i in range(7)}}
        b = {2: {i: 5 for i in range(7)}}
        assert optimized_split(q, f, b) == 3

    def test_optimized_split_no_index_rows(self):
        q = Query(0, 1, 2, 4)
        assert 1 <= optimized_split(q, {}, {}) <= 3

    def test_optimized_split_within_balanced_window(self):
        q = Query(0, 1, 2, 7)
        f = {1: {i: 10**i for i in range(8)}}
        b = {2: {i: 1 for i in range(8)}}
        assert abs(optimized_split(q, f, b) - default_split(q)) <= 1


class TestAlignSplits:
    def test_modal_offset_applied(self):
        from repro.core.sharing import align_splits_per_cluster

        qs = [Query(0, 1, 2, 5), Query(1, 3, 4, 5), Query(2, 5, 6, 5)]
        # defaults are a=3; two queries voted a=4 (offset +1), one a=3
        splits = {0: 4, 1: 4, 2: 3}
        out = align_splits_per_cluster(qs, [[0, 1, 2]], splits)
        assert out == {0: 4, 1: 4, 2: 4}

    def test_clusters_independent(self):
        from repro.core.sharing import align_splits_per_cluster

        qs = [Query(0, 1, 2, 5), Query(1, 3, 4, 5)]
        out = align_splits_per_cluster(qs, [[0], [1]], {0: 4, 1: 2})
        assert out == {0: 4, 1: 2}

    def test_clamped_to_valid_range(self):
        from repro.core.sharing import align_splits_per_cluster

        qs = [Query(0, 1, 2, 2), Query(1, 3, 4, 2)]
        out = align_splits_per_cluster(qs, [[0, 1]], {0: 1, 1: 1})
        assert all(1 <= a <= 1 for a in out.values())


class TestBasicPlan:
    def test_two_nodes_per_query(self):
        plan = build_basic_plan(PAPER_Q, {q.qid: default_split(q) for q in PAPER_Q})
        assert len(plan.nodes) == 2 * len(PAPER_Q)
        assert len(plan.plans) == len(PAPER_Q)
        assert plan.edges == [] and plan.stops == []
        assert plan.topo_levels == [plan.nodes]

    def test_no_dedup_between_identical_queries(self):
        qs = [Query(0, 1, 2, 4), Query(1, 1, 2, 4)]
        plan = build_basic_plan(qs, {0: 2, 1: 2})
        assert len(plan.nodes) == 4  # BasicEnum shares nothing

    def test_prune_pairs_cap_is_k(self):
        plan = build_basic_plan(PAPER_Q, {q.qid: default_split(q) for q in PAPER_Q})
        caps = {(p[0], p[2]) for p in plan.prune_pairs}
        for pl in plan.plans:
            assert (pl.fnid, pl.k) in caps and (pl.bnid, pl.k) in caps

    def test_budgets_sum_to_k(self):
        plan = build_basic_plan(PAPER_Q, {q.qid: default_split(q) for q in PAPER_Q})
        nodes = {n.nid: n for n in plan.nodes}
        for pl in plan.plans:
            assert nodes[pl.fnid].budget + nodes[pl.bnid].budget == pl.k


class TestSharedPlanStructure:
    def test_every_query_planned(self, paper_plan):
        assert sorted(p.qid for p in paper_plan.plans) == [0, 1, 2, 3, 4]
        for p in paper_plan.plans:
            assert p.fnid >= 0 and p.bnid >= 0

    def test_psi_is_dag_with_levels(self, paper_plan):
        seen = set()
        order = {}
        for i, level in enumerate(paper_plan.topo_levels):
            for n in level:
                order[n.nid] = i
                seen.add(n.nid)
        assert seen == {n.nid for n in paper_plan.nodes}
        for e in paper_plan.edges:
            assert order[e.provider] < order[e.consumer]

    def test_node_ids_unique(self, paper_plan):
        nids = [n.nid for n in paper_plan.nodes]
        assert len(nids) == len(set(nids))

    def test_roots_at_most_once_per_cluster(self, paper_plan):
        # at most one HC-s node per (root, side) *within a cluster*; the
        # paper batch has two clusters, so a (root, side) pair can appear at
        # most twice globally (v4/F does: dominating in C0, q3's source in C1).
        from collections import Counter

        counts = Counter((n.root, n.side) for n in paper_plan.nodes)
        assert all(c <= 2 for c in counts.values())
        assert counts[(4, "F")] == 2

    def test_dominating_nodes_of_example_42(self, paper_plan):
        # Example 4.2: cluster {q0,q1,q2} on G yields dominating HC-s
        # queries q_{v1,2,G} and q_{v4,2,G}.
        dom = {(n.root, n.budget) for n in paper_plan.nodes if n.side == "F"}
        assert (1, 2) in dom and (4, 2) in dom

    def test_example_42_edges(self, paper_plan):
        # q_{v1,2,G} provides to all three initial queries' nodes; q_{v4,2,G}
        # to those of q0 and q2's side... (q0 and q1 per the paper).
        nodes = {n.nid: n for n in paper_plan.nodes}
        v1 = next(n for n in paper_plan.nodes if n.side == "F" and n.root == 1 and n.budget == 2)
        cons_roots = {
            nodes[e.consumer].root for e in paper_plan.edges if e.provider == v1.nid
        }
        assert cons_roots == {0, 2, 5}
        v4 = next(n for n in paper_plan.nodes if n.side == "F" and n.root == 4 and n.budget == 2)
        cons_roots4 = {
            nodes[e.consumer].root for e in paper_plan.edges if e.provider == v4.nid
        }
        assert cons_roots4 == {0, 2}

    def test_backward_sharing_at_v12(self, paper_plan):
        # Fig 5(b): q_{v11,2,Gr} and q_{v13,2,Gr} both reach v12 with budget
        # 1; v12 already roots q_{v12,2,Gr} (query q2), so both link to it.
        nodes = {n.nid: n for n in paper_plan.nodes}
        v12 = next(n for n in paper_plan.nodes if n.side == "B" and n.root == 12)
        assert v12.budget == 2  # q2's own backward node
        cons = {nodes[e.consumer].root for e in paper_plan.edges if e.provider == v12.nid}
        assert {11, 13} <= cons

    def test_stop_rules_reference_plan_nodes(self, paper_plan):
        nids = {n.nid for n in paper_plan.nodes}
        roots = {n.nid: n.root for n in paper_plan.nodes}
        for s in paper_plan.stops:
            assert s.nid in nids and s.provider in nids
            assert roots[s.provider] == s.stop_v

    def test_prune_pair_caps_positive(self, paper_plan):
        assert all(cap >= 1 for _, _, cap in paper_plan.prune_pairs)

    def test_provider_budget_covers_attach(self, paper_plan):
        nodes = {n.nid: n for n in paper_plan.nodes}
        for e in paper_plan.edges:
            assert nodes[e.provider].budget >= e.ra

    def test_initial_nodes_cap_equals_k(self, paper_plan):
        pairs = {(nid, t): cap for nid, t, cap in paper_plan.prune_pairs}
        for p in paper_plan.plans:
            assert pairs[(p.fnid, p.t)] >= p.k
            assert pairs[(p.bnid, p.s)] >= p.k


class TestSharedPlanDegenerate:
    def test_single_query_cluster(self, paper_adj, paper_radj):
        qs = [Query(0, 0, 11, 5)]
        plan = build_shared_plan(
            qs, [[0]], {0: 3}, paper_adj, paper_radj,
            dist_maps(paper_adj, [0], 5), dist_maps(paper_radj, [11], 5),
        )
        assert len(plan.plans) == 1
        assert len(plan.nodes) == 2  # no sharing possible
        assert plan.edges == []

    def test_identical_queries_share_everything(self, paper_adj, paper_radj):
        qs = [Query(0, 0, 11, 5), Query(1, 0, 11, 5)]
        plan = build_shared_plan(
            qs, [[0, 1]], {0: 3, 1: 3}, paper_adj, paper_radj,
            dist_maps(paper_adj, [0], 5), dist_maps(paper_radj, [11], 5),
        )
        # same root+budget → single F node and single B node, two plans
        assert len(plan.nodes) == 2
        assert plan.plans[0].fnid == plan.plans[1].fnid
        assert plan.plans[0].bnid == plan.plans[1].bnid

    def test_k1_query(self, paper_adj, paper_radj):
        qs = [Query(0, 0, 1, 1)]
        plan = build_shared_plan(
            qs, [[0]], {0: 1}, paper_adj, paper_radj,
            dist_maps(paper_adj, [0], 1), dist_maps(paper_radj, [1], 1),
        )
        nodes = {n.nid: n for n in plan.nodes}
        assert nodes[plan.plans[0].bnid].budget == 0
