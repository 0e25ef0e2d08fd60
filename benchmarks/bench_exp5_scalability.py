"""Exp-5 (Fig 11): scalability on samples of the two largest graphs."""
from repro.harness import experiments as ex


def test_exp5(benchmark, spark, emit):
    df = benchmark.pedantic(
        lambda: ex.exp5_scalability(
            spark, ["TW", "FS"], pcts=[40, 70, 100], n_queries=8,
            k_range=(4, 5), algos=["BasicEnum", "BatchEnum"], seed=1,
        ),
        rounds=1, iterations=1,
    )
    emit("exp5_scalability", "Exp-5 — scalability (TW-lite, FS-lite samples)", df)
    assert set(df["dataset"]) == {"TW", "FS"}
