"""Exp-6 (Fig 12): comparison with adapted k-shortest-path algorithms."""
from repro.harness import experiments as ex


def test_exp6(benchmark, spark, emit):
    df = benchmark.pedantic(
        lambda: ex.exp6_ksp(
            spark, ["EP"], n_queries=8, ks=[3, 4, 5], seed=1
        ),
        rounds=1, iterations=1,
    )
    emit("exp6_ksp", "Exp-6 — BatchEnum+ vs DkSP/OnePass (EP)", df)
    assert set(df["algo"]) == {"BatchEnum+", "DkSP", "OnePass"}
