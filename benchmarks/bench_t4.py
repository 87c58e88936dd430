"""T4 benchmark — distributed mergeability at SF=0.1; prints the table."""
from repro.experiments import t4_mergeability as T
from repro.experiments.harness import format_table


def test_t4_mergeability(benchmark, spark):
    df = benchmark.pedantic(
        lambda: T.run(spark, quick=False, sf=0.1), rounds=1, iterations=1
    )
    print("\n" + format_table(df, "T4 mergeability (lineitem SF=0.1)"))
    assert df["weight_ok"].all()
    assert df["max_rel_err"].max() < 0.08
