"""Bayesian classification (Section 5.3, Tables 2-3 protocol).

Paper's test protocol: "generate the values for all the variables
(using the underlying model), then randomly select one variable to
predict, given the values of the remaining variables" — i.e. hide one
uniformly chosen variable per test event and predict it by maximizing
the (approximate) joint probability.

Only the factors whose scope contains the hidden variable ``t`` vary
with the candidate value: ``t``'s own CPD factor and the CPD factors of
``t``'s children (its Markov blanket's local factors), so the argmax is
computed over just those — verified against brute-force enumeration of
the full joint on tiny networks by the tests.
"""
from __future__ import annotations

import numpy as np

from repro.bayesnet.cpd import GroundTruth
from repro.bayesnet.sampling import sample_events
from repro.bayesnet.structure import BayesNet


def make_tests(
    gt: GroundTruth, n_tests: int, *, seed: int
) -> tuple[np.ndarray, np.ndarray]:
    """Test events (sampled from the ground truth, disjoint RNG stream
    from training) and the hidden variable index per event."""
    # Offset far into the stream index space so test events never reuse
    # a training chunk's RNG stream.
    base = 1 << 40
    X = sample_events(gt, base, base + n_tests, seed=seed)
    rng = np.random.default_rng([seed, 0x7E57])
    targets = rng.integers(0, gt.net.n, n_tests)
    return X, targets


def predict_one(model, net: BayesNet, x: np.ndarray, t: int) -> int:
    """Argmax_y P[X_t = y, x_rest] under ``model`` (Definition 4 with
    b = the maximizer). ``model`` exposes ``log_factor(i, xi, pidx)``."""
    J = int(net.cards[t])
    cand = np.tile(x, (J, 1))
    cand[:, t] = np.arange(J)
    score = model.log_factor(t, cand[:, t], net.parent_config_index(cand, t))
    for c in net.children[t]:
        score = score + model.log_factor(
            c, cand[:, c], net.parent_config_index(cand, c)
        )
    return int(np.argmax(score))


def error_rate(
    model, net: BayesNet, X_test: np.ndarray, targets: np.ndarray
) -> float:
    """Fraction of test events whose hidden variable is mispredicted."""
    wrong = 0
    for r in range(X_test.shape[0]):
        t = int(targets[r])
        if predict_one(model, net, X_test[r], t) != int(X_test[r, t]):
            wrong += 1
    return wrong / X_test.shape[0]
