"""Reproduction of "Relative Error Streaming Quantiles" (PODS 2021).

Public surface: the REQ sketch (``repro.core.ReqSketch``), the paper's
baselines (``repro.baselines``), distributed builders (``repro.spark``),
and the per-table experiment harnesses (``repro.experiments``).
"""
