"""Exp-7 (Fig 13): average number of HC-s-t paths per query vs k."""
from repro.harness import experiments as ex


def test_exp7(benchmark, spark, emit):
    df = benchmark.pedantic(
        lambda: ex.exp7_path_counts(
            spark, ["EP"], n_queries=10, ks=[3, 4, 5, 6], seed=1
        ),
        rounds=1, iterations=1,
    )
    emit("exp7_path_counts", "Exp-7 — avg paths per query vs k (EP)", df)
    assert sorted(df["k"]) == [3, 4, 5, 6]
