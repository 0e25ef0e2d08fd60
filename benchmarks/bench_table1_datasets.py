"""Table I: statistics of every synthetic stand-in dataset."""
from repro.harness import experiments as ex


def test_table1(benchmark, spark, emit):
    df = benchmark.pedantic(
        lambda: ex.table1_datasets(spark), rounds=1, iterations=1
    )
    emit("table1", "Table I — dataset statistics (synthetic stand-ins)", df)
    assert len(df) == 12
