"""Micro-benchmarks of the core sketch operations (update/merge/query)."""
import numpy as np
import pytest

from repro.core.req_sketch import ReqSketch
from repro.synth_data import stream_array

N = 1_000_000


@pytest.fixture(scope="module")
def data():
    return stream_array("uniform", N, seed=1)


def test_update_1m_items(benchmark, data):
    """Streaming throughput at k=64 (the experiments' default)."""
    result = benchmark.pedantic(
        lambda: ReqSketch(64, seed=2).update(data), rounds=3, iterations=1
    )
    assert result.total_weight() == N


def test_merge_two_halves(benchmark, data):
    a0 = ReqSketch(64, seed=3).update(data[: N // 2])
    b0 = ReqSketch(64, seed=4).update(data[N // 2 :])

    def run():
        return ReqSketch.merge_of(a0, b0)

    result = benchmark.pedantic(run, rounds=3, iterations=1)
    assert result.total_weight() == N


def test_rank_queries_1k(benchmark, data):
    sk = ReqSketch(64, seed=5).update(data)
    qs = np.linspace(0, 1, 1000)
    out = benchmark.pedantic(lambda: sk.ranks(qs), rounds=5, iterations=1)
    assert out.shape == (1000,)


def test_quantile_queries_1k(benchmark, data):
    sk = ReqSketch(64, seed=6).update(data)
    phis = np.linspace(0, 1, 1000)
    out = benchmark.pedantic(lambda: sk.quantiles(phis), rounds=5, iterations=1)
    assert np.all(np.diff(out) >= 0)


def test_serde_roundtrip(benchmark, data):
    from repro.core import serde

    sk = ReqSketch(64, seed=7).update(data)
    out = benchmark.pedantic(
        lambda: serde.from_bytes(serde.to_bytes(sk)), rounds=10, iterations=1
    )
    assert out.n == N
