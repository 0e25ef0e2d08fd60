"""Property-based tests (hypothesis) over random small digraphs.

These run entirely on the pure-Python reference engine — which the Spark
pipelines are cross-checked against elsewhere — so hundreds of random cases
stay cheap. Invariants follow the paper's definitions (simplicity, hop
bound, HC-s prefix closure, Lemma 4.1 domination containment).
"""
from __future__ import annotations

from hypothesis import given, settings, strategies as st

from repro.core import ref_engine as ref
from repro.core.similarity import mu_from_coeffs


@st.composite
def digraphs(draw, max_n=8):
    n = draw(st.integers(min_value=2, max_value=max_n))
    edges = draw(
        st.sets(
            st.tuples(
                st.integers(0, n - 1), st.integers(0, n - 1)
            ).filter(lambda e: e[0] != e[1]),
            max_size=n * 3,
        )
    )
    adj: dict[int, list[int]] = {}
    for u, v in sorted(edges):
        adj.setdefault(u, []).append(v)
    return adj


def radj_of(adj):
    out: dict[int, list[int]] = {}
    for u, vs in adj.items():
        for v in vs:
            out.setdefault(v, []).append(u)
    return out


@settings(max_examples=150, deadline=None)
@given(digraphs(), st.integers(0, 7), st.integers(0, 7), st.integers(1, 5))
def test_pathenum_equals_naive(adj, s, t, k):
    """The bidirectional, index-pruned split finds exactly the naive set."""
    if s == t:
        return
    assert ref.pathenum_ref(adj, radj_of(adj), s, t, k) == ref.enum_st_paths(
        adj, s, t, k
    )


@settings(max_examples=100, deadline=None)
@given(digraphs(), st.integers(0, 7), st.integers(0, 7), st.integers(1, 4))
def test_st_paths_are_simple_bounded_anchored(adj, s, t, k):
    for p in ref.enum_st_paths(adj, s, t, k):
        assert p[0] == s and p[-1] == t
        assert len(p) - 1 <= k
        assert len(set(p)) == len(p)


@settings(max_examples=100, deadline=None)
@given(digraphs(), st.integers(0, 7), st.integers(0, 4))
def test_hcs_prefix_closed_and_simple(adj, s, k):
    paths = ref.enum_hcs_paths(adj, s, k)
    assert (s,) in paths
    for p in paths:
        assert len(set(p)) == len(p) and len(p) - 1 <= k
        for i in range(1, len(p)):
            assert p[:i] in paths


@settings(max_examples=100, deadline=None)
@given(digraphs(), st.integers(0, 7), st.integers(1, 4))
def test_domination_lemma_41(adj, s, k):
    """Lemma 4.1: if q_{v',k'} dominates q_{v,k} (k' ≤ k − dist(v,v')),
    every dominated path extending past v' contains a dominating path."""
    dists = ref.bfs_dists(adj, s, k)
    big = ref.enum_hcs_paths(adj, s, k)
    for v2, d in dists.items():
        k2 = k - d
        if v2 == s or k2 <= 0:
            continue
        small = ref.enum_hcs_paths(adj, v2, k2)
        # every suffix-from-v2 of a path in `big` of length ≤ k2 is in `small`
        for p in big:
            if v2 in p:
                i = p.index(v2)
                # the suffix may be longer than k2 only if v2 was reached
                # later than its BFS depth; clip to k2.
                suf = p[i : i + k2 + 1]
                if len(p) - 1 - i <= k2:
                    assert p[i:] in small


@settings(max_examples=100, deadline=None)
@given(digraphs(), st.integers(0, 7), st.integers(0, 7), st.integers(1, 4))
def test_distance_triangle(adj, u, w, k):
    d = ref.bfs_dists(adj, u, k)
    for v, dv in d.items():
        for x in adj.get(v, ()):
            if dv + 1 <= k:
                assert ref.bfs_dists(adj, u, k).get(x, 10**9) <= dv + 1


@settings(max_examples=200, deadline=None)
@given(
    st.floats(0, 1, allow_nan=False), st.floats(0, 1, allow_nan=False)
)
def test_mu_bounds_and_symmetry(cf, cb):
    m = mu_from_coeffs(cf, cb)
    assert 0.0 <= m <= 1.0
    assert m == mu_from_coeffs(cb, cf)
    assert m <= max(cf, cb) + 1e-12


@settings(max_examples=100, deadline=None)
@given(digraphs(), st.integers(0, 7), st.integers(1, 4))
def test_monotone_reach(adj, s, k):
    assert ref.reach_set(adj, s, k) <= ref.reach_set(adj, s, k + 1)
