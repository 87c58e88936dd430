"""Spark dataflow around the REQ sketch: distributed builds, grouped UDAF
shape, and oracle-checked exact-rank queries."""
from repro.spark.aggregate import build_sketch, merge_balanced, merge_sequential
from repro.spark.udaf import group_quantiles, group_sketches, merge_group_sketches

__all__ = [
    "build_sketch",
    "merge_balanced",
    "merge_sequential",
    "group_quantiles",
    "group_sketches",
    "merge_group_sketches",
]
