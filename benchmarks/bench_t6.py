"""T6 benchmark — all-quantiles max error (full sizes); prints the table."""
from repro.experiments import t6_all_quantiles as T
from repro.experiments.harness import format_table


def test_t6_all_quantiles(benchmark):
    df = benchmark.pedantic(lambda: T.run(quick=False), rounds=1, iterations=1)
    print("\n" + format_table(df, "T6 all-quantiles simultaneous bound"))
    assert df["head_exact"].all()
    assert df["max_rel_all_y"].max() < 0.05
