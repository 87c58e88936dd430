"""T3 benchmark — tail-accuracy profile (full sizes); prints the table."""
from repro.experiments import t3_accuracy_tails as T
from repro.experiments.harness import format_table


def test_t3_accuracy_tails(benchmark):
    df = benchmark.pedantic(lambda: T.run(quick=False), rounds=1, iterations=1)
    print("\n" + format_table(df, "T3 relative error by rank"))
    print(f"space: {df.attrs['space']}")
    low = df[df["rank"] <= 10]
    assert low["req_max_rel"].max() == 0.0
    assert low["kll_max_rel"].max() > 1.0
