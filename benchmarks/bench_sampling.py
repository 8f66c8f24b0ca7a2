"""Micro-benchmarks: ancestral sampling and stream aggregation kernels."""
import pytest

from repro.bayesnet import networks, sampling
from repro.stream.aggregate import aggregate_local


@pytest.mark.parametrize("name", ["alarm", "munin"])
def test_bench_sampling(benchmark, name):
    gt = networks.ground_truth(name)
    X = benchmark.pedantic(
        lambda: sampling.sample_events(gt, 0, 20_000, seed=1),
        rounds=1, iterations=1,
    )
    assert X.shape == (20_000, gt.net.n)


@pytest.mark.parametrize("name", ["alarm", "link"])
def test_bench_local_aggregation(benchmark, name):
    gt = networks.ground_truth(name)
    cid, sid, n = benchmark.pedantic(
        lambda: aggregate_local(gt, 0, 20_000, k=30, seed=1),
        rounds=1, iterations=1,
    )
    assert n.sum() == 2 * gt.net.n * 20_000
