"""T2 benchmark — space vs eps sweep (full sizes); prints the table."""
from repro.experiments import t2_space_vs_eps as T
from repro.experiments.harness import format_table


def test_t2_space_vs_eps(benchmark):
    df = benchmark.pedantic(lambda: T.run(quick=False), rounds=1, iterations=1)
    print("\n" + format_table(df, "T2 space vs eps"))
    print(f"derived: {df.attrs}")
    assert df["naive_over_req"].iloc[-1] > df["naive_over_req"].iloc[0]
