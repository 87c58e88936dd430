"""T1 benchmark — space vs n sweep (full sizes); prints the table."""
from repro.experiments import t1_space_vs_n as T
from repro.experiments.harness import format_table


def test_t1_space_vs_n(benchmark):
    df = benchmark.pedantic(lambda: T.run(quick=False), rounds=1, iterations=1)
    print("\n" + format_table(df, "T1 space vs n"))
    print(f"derived: {df.attrs}")
    assert (df["naive_retained"] > df["req_retained"]).all()
