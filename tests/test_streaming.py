"""Structured Streaming integration: the foreachBatch wiring produces
the same learned state as the explicit micro-batch loop."""
import numpy as np
import pytest

from repro.bayesnet import networks
from repro.bayesnet.cpd import GroundTruth
from repro.core.learner import train_many
from repro.stream.streaming import run_streaming_learner, stage_stream


@pytest.fixture(scope="module")
def staged(spark, tmp_path_factory):
    gt = GroundTruth.random(networks.chain(5, J=3), seed=41)
    d = str(tmp_path_factory.mktemp("stream"))
    n_batches = stage_stream(spark, gt, d, m=3000, k=4, seed=42, first_batch=512)
    return gt, d, n_batches


class TestStructuredStreaming:
    def test_stages_doubling_batches(self, staged):
        import glob

        gt, d, n_batches = staged
        files = glob.glob(f"{d}/b*.parquet")
        assert len(files) == n_batches
        assert n_batches >= 3

    def test_exact_counts_match_batch_loop(self, spark, staged):
        gt, d, _ = staged
        out = run_streaming_learner(
            spark, gt, d, k=4, eps=0.1, algos=["exact"], seed=43
        )
        model, messages = out["exact"]
        ref = train_many(None, gt, ["exact"], m=3000, k=4, eps=0.1, seed=42)
        np.testing.assert_array_equal(model.values, ref["exact"].model.values)
        assert messages == ref["exact"].total_messages

    def test_approx_engine_runs_under_streaming(self, spark, staged):
        gt, d, _ = staged
        out = run_streaming_learner(
            spark, gt, d, k=4, eps=0.2, algos=["uniform"], seed=44, proto_c=0.1
        )
        model, messages = out["uniform"]
        assert messages > 0
        exact = train_many(None, gt, ["exact"], m=3000, k=4, eps=0.2, seed=42)
        rel = np.abs(model.values - exact["exact"].model.values)
        big = exact["exact"].model.values >= 500
        if big.any():
            assert (
                rel[big] / exact["exact"].model.values[big]
            ).max() < 0.5
