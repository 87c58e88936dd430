"""One module per reproduced table; each exposes run() and PAPER_CLAIM."""
from repro.experiments import (  # noqa: F401
    t1_space_vs_n,
    t2_space_vs_eps,
    t3_accuracy_tails,
    t4_mergeability,
    t5_throughput,
    t6_all_quantiles,
)

ALL_TABLES = {
    "T1": t1_space_vs_n,
    "T2": t2_space_vs_eps,
    "T3": t3_accuracy_tails,
    "T4": t4_mergeability,
    "T5": t5_throughput,
    "T6": t6_all_quantiles,
}
