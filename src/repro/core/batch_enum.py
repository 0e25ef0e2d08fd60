"""BatchEnum / BatchEnum⁺ (Algorithm 4): the paper's contribution.

Pipeline (Alg 4 lines 1-16):

1. **BuildIndex** — shared multi-source BFS index (same as BasicEnum).
2. **ClusterQuery** — pairwise μ from the index's Γ reach sets (one Spark
   self-join), then driver-side hierarchical clustering at threshold γ.
3. **IdentifySubquery** — per cluster, DetectCommonQuery on G and G_r builds
   the query sharing graph Ψ (``repro.core.sharing``).
4. **Enumeration** — Ψ's HC-s nodes are processed level-by-level in
   topological order; each level is one batched Spark enumeration whose
   searches *stop* at provider roots and concatenate the provider's cached
   paths from ``R`` (a persisted DataFrame). Finally every query's forward
   and backward HC-s results are ⊕-concatenated.

``optimized=True`` (BatchEnum⁺) applies the cost-based search-order split
before detection, so sharing operates on the optimized budgets.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro.core import index as idx
from repro.core.basic_enum import RunResult, compute_splits
from repro.core.clustering import cluster_queries
from repro.core.enumeration import EnumStats, assemble, empty_paths, enumerate_nodes
from repro.core.queries import Query
from repro.core.sharing import align_splits_per_cluster, build_shared_plan
from repro.core.similarity import batch_similarity, pairwise_mu
from repro.graph.ops import collect_adjacency, reverse_adjacency, reverse_edges
from repro.harness.timing import StageTimer


def run_batch(
    spark: SparkSession,
    edges: DataFrame,
    queries: list[Query],
    *,
    gamma: float = 0.5,
    optimized: bool = False,
    max_depth: int = 4,
) -> RunResult:
    """Run Algorithm 4 over the batch; returns all HC-s-t paths per query.

    ``max_depth`` caps Ψ's provider-chain length (= sequential enumeration
    levels); see ``repro.core.sharing`` for the rationale.
    """
    timer = StageTimer()
    stats = EnumStats()
    rev = reverse_edges(edges)
    k_max = max(q.k for q in queries)

    with timer.stage("build_index"):
        fwd_index, bwd_index = idx.bidirectional_index(
            spark, edges, rev, [q.s for q in queries], [q.t for q in queries], k_max
        )

    with timer.stage("cluster_query"):
        mu = pairwise_mu(fwd_index, bwd_index, queries)
        clusters = cluster_queries(mu, [q.qid for q in queries], gamma)
        mu_q = batch_similarity(mu, len(queries))

    with timer.stage("identify_subquery"):
        adj = collect_adjacency(edges)
        radj = reverse_adjacency(adj)
        dist_from_s = idx.collect_dists(fwd_index)
        dist_to_t = idx.collect_dists(bwd_index)
        splits = compute_splits(queries, optimized, fwd_index, bwd_index)
        if optimized:
            splits = align_splits_per_cluster(queries, clusters, splits)
        plan = build_shared_plan(
            queries, clusters, splits, adj, radj, dist_from_s, dist_to_t,
            max_depth=max_depth,
        )

    with timer.stage("enumeration"):
        from pyspark.sql import functions as F

        from repro.core.enumeration import build_allow

        allow = build_allow(
            spark, plan.nodes, plan.prune_pairs, fwd_index, bwd_index
        )
        # Only Ψ *providers* must be materialized into the cache R (their
        # results are re-read by consumers, Alg 4 lines 9-10). Leaf nodes —
        # typically the initial HC-s queries carrying the bulk of the rows —
        # stay lazy and flow straight into ⊕ assembly, split by side so each
        # is computed exactly once.
        provider_nids = {e.provider for e in plan.edges}
        cache = empty_paths(spark)
        leaf_f = empty_paths(spark)
        leaf_b = empty_paths(spark)
        side_of = {n.nid: n.side for n in plan.nodes}
        for level in plan.topo_levels:
            level_nids = {n.nid for n in level}
            level_stops = [s for s in plan.stops if s.nid in level_nids]
            res = enumerate_nodes(
                spark, edges, rev, level, plan.prune_pairs,
                fwd_index, bwd_index,
                stops=level_stops, cache=cache, stats=stats, allow=allow,
                materialize=False,
            )
            prov = sorted(level_nids & provider_nids)
            if prov:
                cache = cache.unionByName(
                    res.where(F.col("nid").isin(prov)).localCheckpoint(eager=True)
                )
            lf = sorted(
                n for n in level_nids - provider_nids if side_of[n] == "F"
            )
            lb = sorted(
                n for n in level_nids - provider_nids if side_of[n] == "B"
            )
            if lf:
                leaf_f = leaf_f.unionByName(res.where(F.col("nid").isin(lf)))
            if lb:
                leaf_b = leaf_b.unionByName(res.where(F.col("nid").isin(lb)))
        results = assemble(
            spark, cache.unionByName(leaf_f), plan.plans,
            paths_bwd=cache.unionByName(leaf_b),
        ).localCheckpoint(eager=True)
        n_paths = results.count()

    return RunResult(
        results, timer.seconds, stats,
        {
            "n_paths": n_paths,
            "n_nodes": len(plan.nodes),
            "n_shared_edges": len(plan.edges),
            "n_clusters": len(clusters),
            "n_levels": len(plan.topo_levels),
            "mu_q": mu_q,
        },
    )
