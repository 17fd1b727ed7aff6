"""Statistical checks of Theorem 5: ξ→u(s, G) concentrates around OPT.

The full bound needs θ ≥ l(2+ε)·n·log n / (ε²·OPT); we verify the
concentration behaviour it implies — the estimator is unbiased and its
error shrinks as θ grows — on the toy graph where OPT is known exactly.
"""
import numpy as np
import pytest

from repro.core.decrease import decrease_es
from repro.graphs.toy import toy_local_graph

OPT_V5 = 4.66  # exact Δ(v5) from Example 2


def _err(theta, seed):
    g = toy_local_graph()
    delta = decrease_es(g, theta=theta, seed=seed)
    return abs(delta[g.to_local(5)] - OPT_V5)


def test_estimator_error_shrinks_with_theta():
    """Mean |ξ − OPT| over independent repetitions decreases in θ."""
    small = np.mean([_err(100, s) for s in range(12)])
    large = np.mean([_err(4000, s) for s in range(12)])
    assert large < small


def test_estimator_is_unbiased():
    g = toy_local_graph()
    ests = [
        decrease_es(g, theta=800, seed=s)[g.to_local(5)] for s in range(20)
    ]
    assert np.mean(ests) == pytest.approx(OPT_V5, abs=0.05)


@pytest.mark.parametrize("eps", [0.05, 0.1])
def test_relative_error_within_eps_at_large_theta(eps):
    """At θ = 20k (≫ the toy bound scale), |ξ−OPT| < ε·OPT holds."""
    assert _err(20_000, 3) < eps * OPT_V5


def test_theorem5_theta_formula_positive():
    """The sample-size bound is computable and positive for valid inputs."""
    n, l, eps, opt = 9, 1, 0.1, OPT_V5
    theta = l * (2 + eps) * n * np.log(n) / (eps**2 * opt)
    assert theta > 0
    # and the empirical error at that θ respects the bound's target
    assert _err(int(theta) + 1, 11) < eps * OPT_V5 * 3  # slack: single trial
