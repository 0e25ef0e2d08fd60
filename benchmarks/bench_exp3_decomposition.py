"""Exp-3 (Fig 9): BatchEnum+ stage decomposition."""
from repro.harness import experiments as ex


def test_exp3(benchmark, spark, emit):
    df = benchmark.pedantic(
        lambda: ex.exp3_decomposition(
            spark, ["EP", "SL", "WT", "BS"], n_queries=12, k_range=(4, 5), seed=1
        ),
        rounds=1, iterations=1,
    )
    emit("exp3_decomposition", "Exp-3 — BatchEnum+ stage decomposition", df)
    assert len(df) == 4
