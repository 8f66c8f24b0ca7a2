"""Tests for the error-budget allocation (Sections 4.3-4.5, 5.2)."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.bayesnet import networks
from repro.bayesnet.structure import BayesNet
from repro.core import budget


def random_net(seed: int, n: int = 6) -> BayesNet:
    rng = np.random.default_rng(seed)
    parents = [[]] + [
        sorted(rng.choice(j, size=min(j, int(rng.integers(0, 3))), replace=False).tolist())
        for j in range(1, n)
    ]
    return BayesNet("rand", parents, rng.integers(2, 6, n))


class TestBaselineUniform:
    def test_baseline_value(self):
        net = networks.chain(9, J=2)
        a, b = budget.per_variable_eps(net, "baseline", 0.27)
        np.testing.assert_allclose(a, 0.27 / 27)
        np.testing.assert_allclose(b, 0.27 / 27)

    def test_uniform_value(self):
        net = networks.chain(16, J=2)
        a, b = budget.per_variable_eps(net, "uniform", 0.16)
        np.testing.assert_allclose(a, 0.16 / 64)
        np.testing.assert_allclose(b, 0.16 / 64)

    def test_uniform_looser_than_baseline_for_large_n(self):
        net = networks.make("link")
        a_b, _ = budget.per_variable_eps(net, "baseline", 0.1)
        a_u, _ = budget.per_variable_eps(net, "uniform", 0.1)
        # Looser counters (bigger eps) => fewer messages; the whole point
        # of UNIFORM's refined analysis (Sec 4.4).
        assert np.all(a_u > a_b)

    @pytest.mark.parametrize("algo", ["baseline", "uniform", "nonuniform"])
    def test_eps_positive_and_small(self, algo):
        net = networks.make("alarm")
        a, b = budget.per_variable_eps(net, algo, 0.1)
        assert np.all(a > 0) and np.all(b > 0)
        assert a.max() < 1 and b.max() < 1

    @pytest.mark.parametrize("bad", [0.0, 1.0, -0.5, 2.0])
    def test_eps_range_validated(self, bad):
        with pytest.raises(ValueError):
            budget.per_variable_eps(networks.chain(3), "uniform", bad)

    def test_unknown_algo_rejected(self):
        with pytest.raises(ValueError, match="unknown"):
            budget.per_variable_eps(networks.chain(3), "exact", 0.1)


class TestNonUniform:
    @given(seed=st.integers(0, 10_000))
    @settings(max_examples=30, deadline=None)
    def test_variance_budget_constraint(self, seed):
        """Eq (4)/(7): the optimal nu satisfy sum nu_i^2 = eps^2/256,
        and likewise mu (Eq 8) — for any network shape."""
        net = random_net(seed)
        eps = 0.2
        nu, mu = budget.per_variable_eps(net, "nonuniform", eps)
        assert np.sum(nu**2) == pytest.approx(eps**2 / 256)
        assert np.sum(mu**2) == pytest.approx(eps**2 / 256)

    @given(seed=st.integers(0, 10_000))
    @settings(max_examples=20, deadline=None)
    def test_lagrange_optimality(self, seed):
        """No feasible perturbation of the nu allocation has lower
        asymptotic cost sum J_i K_i / nu_i (Eq 5)."""
        net = random_net(seed)
        eps = 0.1
        nu, _ = budget.per_variable_eps(net, "nonuniform", eps)
        J, K = net.cards.astype(float), net.K.astype(float)
        cost_opt = np.sum(J * K / nu)
        rng = np.random.default_rng(seed + 1)
        for _ in range(10):
            pert = nu * np.exp(rng.normal(0, 0.3, net.n))
            pert *= np.sqrt((eps**2 / 256) / np.sum(pert**2))  # re-feasibilize
            assert np.sum(J * K / pert) >= cost_opt * (1 - 1e-9)

    def test_matches_closed_form(self):
        net = networks.make("new-alarm")
        eps = 0.1
        J, K = net.cards.astype(float), net.K.astype(float)
        nu, mu = budget.per_variable_eps(net, "nonuniform", eps)
        alpha = np.sqrt(np.sum((J * K) ** (2 / 3)))
        beta = np.sqrt(np.sum(K ** (2 / 3)))
        np.testing.assert_allclose(nu, (J * K) ** (1 / 3) * eps / (16 * alpha))
        np.testing.assert_allclose(mu, K ** (1 / 3) * eps / (16 * beta))

    def test_high_cardinality_gets_looser_counters(self):
        """The Sec 4.5 comparison: variables with large J_i K_i receive
        larger nu (cheaper counters)."""
        net = networks.make("new-alarm")
        nu, _ = budget.per_variable_eps(net, "nonuniform", 0.1)
        jk = (net.cards * net.K).astype(float)
        hi, lo = np.argmax(jk), np.argmin(jk)
        assert nu[hi] > nu[lo]

    def test_homogeneous_equals_uniform_shape(self):
        """On a fully homogeneous network the nonuniform allocation is
        flat (all nu equal)."""
        net = networks.chain(10, J=3)
        nu, mu = budget.per_variable_eps(net, "nonuniform", 0.1)
        assert np.allclose(nu[1:], nu[1])  # node 0 has K=1, others K=3
        assert np.allclose(mu[1:], mu[1])


class TestCounterEps:
    @pytest.mark.parametrize("algo", ["baseline", "uniform", "nonuniform"])
    def test_flat_expansion_layout(self, algo):
        net = networks.chain(4, J=3)
        flat = budget.counter_eps(net, algo, 0.1)
        a, b = budget.per_variable_eps(net, algo, 0.1)
        assert len(flat) == net.n_counters
        for i in range(net.n):
            assert np.all(flat[net.fam_offset[i] : net.fam_offset[i + 1]] == a[i])
            assert np.all(flat[net.par_offset[i] : net.par_offset[i + 1]] == b[i])


class TestNaiveBayes:
    def test_eq9_family_allocation(self):
        net = networks.naive_bayes(5, J_root=3, J_leaf=4)
        flat = budget.naive_bayes_eps(net, 0.1)
        J = net.cards.astype(float)
        denom = np.sqrt(np.sum(J[1:] ** (2 / 3)))
        for i in [1, 4]:
            expect = (0.1 / 16) * J[i] ** (1 / 3) / denom
            assert flat[net.fam_offset[i]] == pytest.approx(expect)

    def test_parent_counters_at_eps_over_3n(self):
        net = networks.naive_bayes(5, J_root=3, J_leaf=4)
        flat = budget.naive_bayes_eps(net, 0.1)
        assert np.all(
            flat[net.par_offset[0] :] == pytest.approx(0.1 / 15)
        )

    def test_requires_nb_structure(self):
        with pytest.raises(ValueError, match="naive"):
            budget.naive_bayes_eps(networks.chain(4), 0.1)


class TestPredictedBounds:
    @pytest.mark.parametrize("name", ["alarm", "link"])
    def test_theory_ordering(self, name):
        """Thm 1 vs Lemma 6: UNIFORM's bound beats BASELINE's; Thm 2:
        NONUNIFORM's beats UNIFORM's (they agree on homogeneous nets)."""
        net = networks.make(name)
        b = budget.predicted_message_bound(net, "baseline", 0.1, 30, 10**6)
        u = budget.predicted_message_bound(net, "uniform", 0.1, 30, 10**6)
        nu = budget.predicted_message_bound(net, "nonuniform", 0.1, 30, 10**6)
        assert nu <= u <= b

    def test_exact_bound_is_2mn(self):
        net = networks.make("alarm")
        assert budget.predicted_message_bound(net, "exact", 0.1, 30, 50_000) == (
            2 * 50_000 * 37
        )
