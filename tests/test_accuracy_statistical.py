"""Statistical validation of Theorem 1's error guarantee.

These tests run the sketch over many independent seeds (all pinned, so
runs are deterministic) and check the distributional claims:

* |Err(y)| <= eps * R(y) holds for at least a 1-delta fraction of
  (seed, query) pairs when k is set by Eq. (6);
* Err(y) is (empirically) centred at zero — the estimator is unbiased;
* error *scales with rank*: absolute error grows with R(y), relative
  error stays flat (the defining property versus additive sketches).
"""
import numpy as np
import pytest

from repro.baselines.exact import ExactRanks, relative_errors
from repro.core.req_sketch import ReqSketch
from repro.synth_data import stream_array

N = 1 << 16
EPS, DELTA = 0.1, 0.1
TRIALS = 20


@pytest.fixture(scope="module")
def trials():
    """(est, true) ranks at a log grid for TRIALS independent sketches."""
    rows = []
    data = stream_array("permutation", N, seed=123)
    ex = ExactRanks(data)
    ranks = np.unique(np.clip(np.logspace(0, np.log10(N), 30).astype(int), 1, N))
    ys = ex.values_at_ranks(ranks)
    true = ex.ranks(ys)
    for seed in range(TRIALS):
        sk = ReqSketch.from_error_streaming(EPS, DELTA, N, seed=seed).update(data)
        rows.append(sk.ranks(ys).astype(np.int64))
    return np.vstack(rows), true, ranks


def test_eps_bound_violation_rate(trials):
    """Theorem 13: Pr[|Err| >= eps*R] < 3*delta per query.  Measured
    violation rate across all (trial, query) pairs must be far below it
    (Eq. 6's constants are conservative; in practice it is ~0)."""
    est, true, _ = trials
    rel = np.abs(est - true) / true
    violation_rate = float((rel > EPS).mean())
    assert violation_rate <= DELTA, violation_rate


def test_error_centred(trials):
    """Mean signed error ~ 0 (compaction coin flips are +-1 symmetric)."""
    est, true, _ = trials
    signed = (est - true).astype(float)
    # Normalize by rank so every query contributes comparably.
    norm = signed / true
    assert abs(norm.mean()) < EPS / 4


def test_relative_error_flat_absolute_grows(trials):
    """Relative error at rank ~n must NOT be much worse than at rank
    ~sqrt(n) (flat profile), while absolute error grows with rank."""
    est, true, ranks = trials
    rel = np.abs(est - true) / true
    absolute = np.abs(est - true).astype(float)
    mid = ranks.searchsorted(int(np.sqrt(N)))
    rel_low = rel[:, :mid].max()
    rel_high = rel[:, mid:].max()
    assert rel_high <= max(rel_low, 0.005) * 10 + 1e-9
    # Absolute error at the largest ranks dwarfs the error at the head
    # (which is exactly zero).
    assert absolute[:, :3].max() == 0
    assert absolute[:, -5:].max() > 0


def test_head_exact_every_trial(trials):
    est, true, ranks = trials
    sk = ReqSketch.from_error_streaming(EPS, DELTA, N, seed=0)
    head_ranks = ranks <= sk.B // 2
    assert np.all(est[:, head_ranks] == true[head_ranks])


@pytest.mark.parametrize("kind", ["lognormal", "uniform", "zipf_values"])
def test_distribution_robustness(kind):
    """The guarantee is comparison-based — distribution-free.  Spot-check
    heavy-tailed and discrete-heavy inputs."""
    data = stream_array(kind, N, seed=7)
    ex = ExactRanks(data)
    ranks = np.unique(np.clip(np.logspace(0, np.log10(N), 25).astype(int), 1, N))
    ys = ex.values_at_ranks(ranks)
    sk = ReqSketch.from_error_streaming(EPS, DELTA, N, seed=7).update(data)
    rel = relative_errors(sk.ranks(ys), ex.ranks(ys))
    assert rel.max() <= EPS, rel.max()


def test_smaller_eps_smaller_error():
    """Shrinking the target eps must shrink the realized error (averaged
    over seeds)."""
    data = stream_array("permutation", N, seed=9)
    ex = ExactRanks(data)
    ranks = np.unique(np.clip(np.logspace(1, np.log10(N), 20).astype(int), 1, N))
    ys = ex.values_at_ranks(ranks)
    true = ex.ranks(ys)

    def mean_err(eps):
        tot = 0.0
        for seed in range(5):
            sk = ReqSketch.from_error_streaming(eps, DELTA, N, seed=seed).update(data)
            tot += relative_errors(sk.ranks(ys), true).mean()
        return tot / 5

    assert mean_err(0.05) <= mean_err(0.4) + 1e-12


def test_small_delta_parameterization_accurate():
    """Theorem 2 (Eq. 36): the log log(1/delta) parameterization also
    meets the eps bound (its k is larger per-section but level count is
    the same; spot-check at tiny delta)."""
    data = stream_array("permutation", N, seed=11)
    ex = ExactRanks(data)
    ranks = np.unique(np.clip(np.logspace(0, np.log10(N), 25).astype(int), 1, N))
    ys = ex.values_at_ranks(ranks)
    sk = ReqSketch.from_error_small_delta(EPS, 1e-12, N, seed=11).update(data)
    rel = relative_errors(sk.ranks(ys), ex.ranks(ys))
    assert rel.max() <= EPS, rel.max()
