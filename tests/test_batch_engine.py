"""Tests of the vectorized batched counter engine, including the
exact-in-distribution suffix-geometric decomposition (DESIGN.md 2.2)."""
import numpy as np
import pytest

from repro.distmon.batch import BatchCounterEngine, ExactCounterEngine
from repro.distmon.counters import SeqDistCounter


def single(eps=0.3, k=4, seed=0, proto_c=1.0, nc=1):
    return BatchCounterEngine(np.full(nc, eps), k, seed=seed, proto_c=proto_c)


class TestExactEngine:
    def test_counts_and_messages(self):
        e = ExactCounterEngine(3)
        e.update(np.array([0, 2]), np.array([0, 1]), np.array([5, 7]))
        e.update(np.array([2]), np.array([0]), np.array([1]))
        assert e.estimates().tolist() == [5.0, 0.0, 8.0]
        assert e.total_messages == 13


class TestEngineBasics:
    def test_rejects_nonpositive_eps(self):
        with pytest.raises(ValueError):
            BatchCounterEngine(np.array([0.1, 0.0]), 4, seed=0)

    def test_empty_update_noop(self):
        e = single()
        e.update(np.array([], dtype=np.int64), np.array([], dtype=np.int64), np.array([], dtype=np.int64))
        assert e.total_messages == 0

    def test_exact_counts_always_truth(self):
        e = single(nc=3)
        e.update(np.array([0, 1]), np.array([0, 1]), np.array([10, 20]))
        e.update(np.array([0]), np.array([2]), np.array([5]))
        assert e.exact_counts().tolist() == [15, 20, 0]

    def test_exact_regime_when_threshold_not_reached(self):
        """eps loose + small counts => p stays 1, estimate is exact and
        messages equal increments."""
        e = single(eps=0.9, k=1)  # threshold sqrt(1)/0.9 ~ 1.1... use tiny counts
        e.update(np.array([0]), np.array([0]), np.array([1]))
        assert e.estimates()[0] == 1.0
        assert e.total_messages == 1

    def test_p1_batch_reports_final_value(self):
        e = single(eps=1e-9)  # threshold astronomically large -> p == 1
        e.p[:] = 1.0
        e.update(np.array([0]), np.array([2]), np.array([100]))
        assert e.total_messages == 100
        assert e.r[0, 2] == 100
        assert e.estimates()[0] == 100.0

    def test_counters_independent(self):
        e = single(nc=2, eps=0.3)
        e.update(np.array([0]), np.array([0]), np.array([50_000]))
        assert e.exact_counts()[1] == 0
        assert e.estimates()[1] == 0.0
        assert e.messages[1] == 0

    def test_messages_per_counter_sum(self):
        e = single(nc=4, eps=0.4)
        rng = np.random.default_rng(0)
        for _ in range(10):
            e.update(np.arange(4), rng.integers(0, 4, 4), rng.integers(1, 100, 4))
        assert e.messages.sum() == e.total_messages

    def test_deterministic_given_seed(self):
        def run():
            e = single(nc=2, seed=42)
            for b in range(8):
                e.update(np.array([0, 1]), np.array([b % 4, (b + 1) % 4]), np.array([200, 300]))
            return e.total_messages, e.estimates().copy()

        m1, e1 = run()
        m2, e2 = run()
        assert m1 == m2
        np.testing.assert_array_equal(e1, e2)


class TestDecompositionExactness:
    """The (Geometric suffix, Binomial prefix) sampling must reproduce the
    per-item Bernoulli process exactly: message probability, message
    count moments, and last-report value."""

    def run_many(self, n, p, reps=40_000, seed=1):
        e = BatchCounterEngine(np.full(reps, 0.5), k=1, seed=seed)
        e.p[:] = p  # force the reporting probability under test
        e.round_est[:] = 1e18  # freeze rounds: test the batch kernel alone
        cid = np.arange(reps)
        e.update(cid, np.zeros(reps, dtype=np.int64), np.full(reps, n))
        return e

    def test_message_probability(self):
        n, p = 20, 0.05
        e = self.run_many(n, p)
        got = np.mean(e.messages > 0)
        assert got == pytest.approx(1 - (1 - p) ** n, abs=0.01)

    def test_message_count_mean(self):
        n, p = 20, 0.05
        e = self.run_many(n, p)
        assert e.messages.mean() == pytest.approx(n * p, rel=0.05)

    def test_message_count_variance(self):
        n, p = 20, 0.05
        e = self.run_many(n, p)
        assert e.messages.var() == pytest.approx(n * p * (1 - p), rel=0.08)

    def test_last_report_matches_bernoulli_brute_force(self):
        """Compare E[last reported value | >=1 message] against a direct
        per-item Bernoulli simulation."""
        n, p, reps = 15, 0.2, 40_000
        e = self.run_many(n, p, reps=reps, seed=3)
        rep = e.r[:, 0]
        got = rep[e.messages > 0].mean()
        rng = np.random.default_rng(9)
        draws = rng.random((reps, n)) < p
        any_msg = draws.any(axis=1)
        last = n - np.argmax(draws[any_msg][:, ::-1], axis=1)
        assert got == pytest.approx(last.mean(), rel=0.01)


class TestStatisticalGuarantees:
    def test_unbiased_and_variance_bound(self):
        """Batched engine run per-event (batch size 1) reproduces the
        sequential counter's guarantees: E[A] ~= C, sd <= eps*C."""
        C, eps, k, trials = 1200, 0.4, 4, 100
        ests = []
        for t in range(trials):
            e = BatchCounterEngine(np.array([eps]), k, seed=1000 + t)
            sites = np.random.default_rng(t).integers(0, k, C)
            for s in sites:
                e.update(np.array([0]), np.array([s]), np.array([1]))
            ests.append(e.estimates()[0])
        ests = np.array(ests)
        se = ests.std() / np.sqrt(trials)
        assert abs(ests.mean() - C) < 4 * se + 0.02 * C
        assert ests.std() <= eps * C * 1.2

    def test_big_batches_still_accurate(self):
        """Doubling batches (the production path) keep relative error
        within a few eps."""
        eps, k = 0.2, 4
        errs = []
        for t in range(40):
            e = BatchCounterEngine(np.array([eps]), k, seed=t)
            total, size = 0, 64
            while total < 40_000:
                b = min(size, 40_000 - total)
                per = np.full(k, b // k)
                per[: b % k] += 1
                e.update(np.zeros(k, dtype=np.int64), np.arange(k), per)
                total += b
                size *= 2
            errs.append(abs(e.estimates()[0] - 40_000) / 40_000)
        assert np.median(errs) < 2 * eps
        assert np.mean(errs) < 2 * eps

    def test_message_cost_logarithmic(self):
        """10x the stream, much less than 10x the messages."""
        def msgs(C, seed=5):
            e = BatchCounterEngine(np.array([0.3]), 4, seed=seed)
            total, size = 0, 64
            while total < C:
                b = min(size, C - total)
                e.update(np.array([0]), np.array([total % 4]), np.array([b]))
                total += b
                size *= 2
            return e.total_messages

        assert msgs(100_000) < 3 * msgs(10_000)

    def test_tighter_eps_more_messages_batched(self):
        def msgs(eps):
            e = BatchCounterEngine(np.array([eps]), 4, seed=8)
            for _ in range(20):
                e.update(np.array([0]), np.array([0]), np.array([2000]))
            return e.total_messages

        assert msgs(0.02) > msgs(0.5)
