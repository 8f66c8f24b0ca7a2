"""Micro-benchmarks: the distributed-counter engines."""
import numpy as np
import pytest

from repro.core.budget import counter_eps
from repro.bayesnet import networks
from repro.distmon.batch import BatchCounterEngine
from repro.stream.aggregate import aggregate_local
from repro.stream.events import batch_ranges


@pytest.fixture(scope="module")
def alarm_batches():
    gt = networks.ground_truth("alarm")
    return gt, [
        aggregate_local(gt, lo, hi, k=30, seed=3)
        for lo, hi in batch_ranges(50_000, first=1024)
    ]


def test_bench_batch_engine_alarm_50k(benchmark, alarm_batches):
    """Protocol throughput: all ALARM counters over a 50K-event stream
    (aggregates precomputed; this times the coordinator+site protocol)."""
    gt, batches = alarm_batches
    eps = counter_eps(gt.net, "nonuniform", 0.1)

    def run():
        eng = BatchCounterEngine(eps, 30, seed=1, proto_c=0.1)
        for cid, sid, n in batches:
            eng.update(cid, sid, n)
        return eng.total_messages

    msgs = benchmark(run)
    assert 0 < msgs < 2 * 50_000 * gt.net.n


def test_bench_engine_many_counters(benchmark):
    """1M-row batched update across 100K counters."""
    rng = np.random.default_rng(0)
    nc, rows = 100_000, 700_000
    key = rng.choice(nc * 8, size=rows, replace=False)
    cid, sid = key // 8, key % 8
    n = rng.integers(1, 50, rows)

    def run():
        eng = BatchCounterEngine(np.full(nc, 1e-3), 8, seed=2, proto_c=0.1)
        eng.update(cid, sid, n)
        return eng.total_messages

    assert benchmark(run) > 0
