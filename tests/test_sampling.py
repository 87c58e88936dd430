"""Tests for the subsampling baselines (paper footnote 1)."""
import numpy as np
import pytest

from repro.baselines.exact import ExactRanks
from repro.baselines.sampling import BernoulliSampler, ReservoirSampler
from repro.synth_data import stream_array


class TestBernoulli:
    def test_bad_rate_rejected(self):
        with pytest.raises(ValueError):
            BernoulliSampler(0.0)
        with pytest.raises(ValueError):
            BernoulliSampler(1.5)

    def test_rate_one_keeps_all(self):
        s = BernoulliSampler(1.0, seed=0).update(np.arange(100.0))
        assert s.num_retained() == 100

    def test_expected_sample_size(self):
        s = BernoulliSampler(0.1, seed=1).update(stream_array("uniform", 50_000, seed=1))
        assert 4_000 < s.num_retained() < 6_000

    def test_rank_estimate_unbiased_mid(self):
        n = 50_000
        data = stream_array("permutation", n, seed=2)
        ests = []
        for seed in range(10):
            s = BernoulliSampler(0.05, seed=seed).update(data)
            ests.append(s.rank(n / 2))
        assert abs(np.mean(ests) - n / 2) < 0.05 * n

    def test_low_rank_relative_error_explodes(self):
        """The motivating failure: at rank 10, a 5% sample is hopeless."""
        n = 50_000
        data = stream_array("permutation", n, seed=3)
        ex = ExactRanks(data)
        y = ex.value_at_rank(10)
        rels = []
        for seed in range(10):
            s = BernoulliSampler(0.05, seed=100 + seed).update(data)
            rels.append(abs(s.rank(y) - 10) / 10)
        assert max(rels) > 0.5  # at least one seed badly wrong

    def test_merge(self):
        a = BernoulliSampler(0.1, seed=4).update(np.arange(1000.0))
        b = BernoulliSampler(0.1, seed=5).update(np.arange(1000.0, 2000.0))
        a.merge(b)
        assert a.n == 2000
        with pytest.raises(ValueError):
            a.merge(BernoulliSampler(0.2))


class TestReservoir:
    def test_bad_size_rejected(self):
        with pytest.raises(ValueError):
            ReservoirSampler(0)

    def test_exact_below_capacity(self):
        s = ReservoirSampler(100, seed=0).update(np.arange(50.0))
        assert s.num_retained() == 50 and s.n == 50

    def test_capped_at_m(self):
        s = ReservoirSampler(64, seed=1).update(stream_array("uniform", 5000, seed=1))
        assert s.num_retained() == 64 and s.n == 5000

    def test_uniformity_mean(self):
        """Sample mean of U[0,1) reservoir ~ 0.5 across seeds."""
        means = []
        for seed in range(10):
            s = ReservoirSampler(200, seed=seed).update(
                stream_array("uniform", 20_000, seed=50 + seed)
            )
            means.append(s.sample_mean() if hasattr(s, "sample_mean") else s._res.mean())
        assert abs(np.mean(means) - 0.5) < 0.03

    def test_rank_estimate_mid(self):
        n = 20_000
        data = stream_array("permutation", n, seed=6)
        s = ReservoirSampler(500, seed=6).update(data)
        assert abs(s.rank(n / 2) - n / 2) < 0.15 * n

    def test_merge_sizes(self):
        a = ReservoirSampler(100, seed=7).update(stream_array("uniform", 3000, seed=7))
        b = ReservoirSampler(100, seed=8).update(stream_array("uniform", 7000, seed=8))
        a.merge(b)
        assert a.n == 10_000 and a.num_retained() == 100
        with pytest.raises(ValueError):
            a.merge(ReservoirSampler(50))

    def test_merge_empty(self):
        a = ReservoirSampler(10, seed=9)
        a.merge(ReservoirSampler(10, seed=10))
        assert a.n == 0
