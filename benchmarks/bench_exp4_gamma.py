"""Exp-4 (Fig 10): efficiency vs clustering threshold gamma."""
from repro.harness import experiments as ex


def test_exp4(benchmark, spark, emit):
    df = benchmark.pedantic(
        lambda: ex.exp4_gamma(
            spark, ["EP"], n_queries=12, gammas=[0.1, 0.5, 0.9, 1.0],
            k_range=(4, 5), seed=1,
        ),
        rounds=1, iterations=1,
    )
    emit("exp4_gamma", "Exp-4 — BatchEnum+ vs gamma (EP)", df)
    assert len(df) == 4
