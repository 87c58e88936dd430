"""T5 benchmark — update-cost sweep over k (full sizes); prints the table."""
from repro.experiments import t5_throughput as T
from repro.experiments.harness import format_table


def test_t5_throughput(benchmark):
    df = benchmark.pedantic(lambda: T.run(quick=False), rounds=1, iterations=1)
    print("\n" + format_table(df, "T5 amortized update cost"))
    assert df["cost_ratio_vs_first"].iloc[-1] < 4.0
