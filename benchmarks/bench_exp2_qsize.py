"""Exp-2 (Fig 8): processing time vs query-set size."""
from repro.harness import experiments as ex


def test_exp2(benchmark, spark, emit):
    df = benchmark.pedantic(
        lambda: ex.exp2_query_set_size(
            spark, ["EP"], sizes=[8, 16, 24], k_range=(4, 5),
            algos=["BasicEnum", "BasicEnum+", "BatchEnum", "BatchEnum+"], seed=1,
        ),
        rounds=1, iterations=1,
    )
    emit("exp2_qsize", "Exp-2 — time/work vs |Q| (EP)", df)
    assert sorted(df["n_queries"].unique()) == [8, 16, 24]
