"""Exp-1 (Fig 7): processing time & speedup vs batch similarity."""
from repro.harness import experiments as ex


def test_exp1(benchmark, spark, emit):
    # WT is the sparse stand-in: its k-hop neighbourhoods are local, so the
    # share knob actually sweeps μ_Q instead of saturating near 1 as it
    # does on small dense graphs.
    df = benchmark.pedantic(
        lambda: ex.exp1_similarity(
            spark, ["WT"], n_queries=12, shares=[0.0, 0.5, 0.9],
            k_range=(4, 6), min_dist=3, seed=1,
        ),
        rounds=1, iterations=1,
    )
    emit("exp1_similarity", "Exp-1 — time/work vs batch similarity (WT)", df)
    assert set(df["algo"]) >= {"PathEnum", "BasicEnum", "BatchEnum", "BatchEnum+"}
