"""Benchmark: Table 2 — train all four algorithms and classify.

Runs the full Tables 2+3 pipeline per network at a reduced stream size
(REPRO_BENCH_M, default 10K) through the Spark aggregation path, and
asserts the Table 2 qualitative finding: approximate classifiers match
EXACTMLE within a few points.
"""
import os

import pytest

from repro.bayesnet import networks
from repro.core import classify
from repro.core.learner import train_many
from repro.experiments import ALGOS, Config

BENCH_M = int(os.environ.get("REPRO_BENCH_M", 10_000))


@pytest.mark.parametrize("name", ["alarm", "hepar2", "link", "munin"])
def test_bench_table2_classification(benchmark, spark, name):
    cfg = Config()
    gt = networks.ground_truth(name)

    def run():
        res = train_many(
            spark, gt, ALGOS, m=BENCH_M, k=cfg.k, eps=cfg.eps,
            seed=cfg.seed, proto_c=cfg.proto_c,
        )
        Xt, targets = classify.make_tests(gt, 200, seed=cfg.seed + 1)
        return {
            a: classify.error_rate(res[a].model, gt.net, Xt, targets)
            for a in ALGOS
        }

    errs = benchmark.pedantic(run, rounds=1, iterations=1)
    for a in ["baseline", "uniform", "nonuniform"]:
        assert abs(errs[a] - errs["exact"]) < 0.08, (a, errs)
