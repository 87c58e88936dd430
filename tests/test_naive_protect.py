"""Tests for the naive protect-half baseline (paper's ε⁻² strawman)."""
import numpy as np
import pytest

from repro.baselines.exact import ExactRanks, relative_errors
from repro.baselines.naive_protect import (
    k_naive_for_error,
    naive_for_error,
    naive_protect_sketch,
)
from repro.core.req_sketch import ReqSketch
from repro.synth_data import stream_array


class TestConstruction:
    def test_is_req_with_all_schedule(self):
        sk = naive_protect_sketch(8)
        assert isinstance(sk, ReqSketch) and sk.schedule == "all"

    def test_k_naive_quadratic_in_eps(self):
        k1, k2 = k_naive_for_error(0.2, 0.1), k_naive_for_error(0.1, 0.1)
        assert 3.5 <= k2 / k1 <= 4.5  # halving eps ~quadruples k

    def test_k_naive_even(self):
        for eps in (0.3, 0.15, 0.07):
            assert k_naive_for_error(eps, 0.1) % 2 == 0

    def test_bad_params_rejected(self):
        with pytest.raises(ValueError):
            k_naive_for_error(0, 0.1)
        with pytest.raises(ValueError):
            k_naive_for_error(0.1, 0.9)

    def test_naive_for_error_no_growth(self):
        n = 10_000
        sk = naive_for_error(0.2, 0.1, n)
        assert sk.N >= n


class TestBehaviour:
    def test_every_compaction_takes_half(self):
        """After any scheduled compaction the buffer holds exactly B/2."""
        sk = naive_protect_sketch(8, N0=100_000)
        B = sk.B
        sk.update(np.arange(float(B)))
        assert len(sk.levels[0]) == B // 2

    def test_weight_conserved(self):
        n = 30_000
        sk = naive_protect_sketch(8, seed=1).update(stream_array("uniform", n, seed=1))
        assert sk.total_weight() == n

    def test_accuracy_at_target_eps(self):
        """Parameterized for eps, the naive schedule does meet the bound
        (it is correct — just wasteful)."""
        n = 20_000
        eps = 0.2
        data = stream_array("permutation", n, seed=2)
        sk = naive_for_error(eps, 0.1, n, seed=2).update(data)
        ex = ExactRanks(data)
        ranks = np.unique(np.clip(np.logspace(0, np.log10(n), 30).astype(int), 1, n))
        ys = ex.values_at_ranks(ranks)
        rel = relative_errors(sk.ranks(ys), ex.ranks(ys))
        assert rel.max() <= eps

    def test_worse_error_than_req_at_equal_k(self):
        """Same k, same space class — the trailing-ones schedule wins on
        mid/tail accuracy (averaged over seeds to damp luck)."""
        n = 1 << 17
        req_errs, naive_errs = [], []
        for seed in range(5):
            data = stream_array("permutation", n, seed=40 + seed)
            ex = ExactRanks(data)
            ranks = np.unique(np.clip(np.logspace(2, np.log10(n), 25).astype(int), 1, n))
            ys = ex.values_at_ranks(ranks)
            req = ReqSketch(16, seed=seed, N0=n).update(data)
            naive = naive_protect_sketch(16, seed=seed, N0=n).update(data)
            req_errs.append(relative_errors(req.ranks(ys), ex.ranks(ys)).max())
            naive_errs.append(relative_errors(naive.ranks(ys), ex.ranks(ys)).max())
        assert np.mean(naive_errs) > np.mean(req_errs)

    def test_mergeable(self):
        a = naive_protect_sketch(8, seed=3).update(stream_array("uniform", 5000, seed=3))
        b = naive_protect_sketch(8, seed=4).update(stream_array("uniform", 5000, seed=4))
        a.merge(b)
        assert a.total_weight() == 10_000
