"""Theorem 1 bound algebra, statistical coverage, and §3.4 tightness."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.bounds import (
    bound_ratio,
    delta_bound,
    epsilon_bound,
    epsilon_bound_waggoner,
    n_required,
)

DS = [2, 5, 7, 12, 24, 161]
NS = [10, 100, 1_000, 10_000, 100_000]
DELTAS = [0.3, 0.05, 0.01, 1e-4]


@pytest.mark.parametrize("d", DS)
@pytest.mark.parametrize("n", NS)
@pytest.mark.parametrize("delta", DELTAS)
def test_inversion_roundtrip(d, n, delta):
    """delta_bound(n, epsilon_bound(n, δ)) recovers δ (when unclamped)."""
    eps = epsilon_bound(n, delta, d)
    back = delta_bound(n, eps, d)
    assert back == pytest.approx(min(1.0, delta), rel=1e-9)


@pytest.mark.parametrize("d", DS)
@pytest.mark.parametrize("delta", DELTAS)
def test_epsilon_decreases_with_n(d, delta):
    eps = epsilon_bound(np.array(NS, dtype=float), delta, d)
    assert np.all(np.diff(eps) < 0)


@pytest.mark.parametrize("d", DS)
@pytest.mark.parametrize("n", [100, 10_000])
def test_epsilon_decreases_with_delta_loosening(d, n):
    """Allowing more failure probability needs a smaller deviation bound."""
    eps = [epsilon_bound(n, dl, d) for dl in sorted(DELTAS)]
    assert eps == sorted(eps, reverse=True)


@pytest.mark.parametrize("d", DS)
def test_delta_bound_range_and_zero_n(d):
    assert delta_bound(0, 0.5, d) == 1.0
    vals = delta_bound(np.array(NS, dtype=float), 0.3, d)
    assert np.all((vals >= 0) & (vals <= 1))
    assert np.all(np.diff(vals) <= 0)


@pytest.mark.parametrize("d", DS)
@pytest.mark.parametrize("eps", [0.05, 0.1, 0.3, 1.0])
@pytest.mark.parametrize("delta", [0.05, 0.01])
def test_n_required_is_sufficient_and_tight(d, eps, delta):
    n = n_required(eps, delta, d)
    assert delta_bound(n, eps, d) <= delta + 1e-12
    if n > 1:
        assert delta_bound(n - 1, eps, d) > delta  # one fewer sample fails


def test_n_required_matches_paper_rate():
    """n = Θ(d/ε²): doubling d ~doubles n; halving ε quadruples n."""
    base = n_required(0.1, 0.01, 24)
    assert n_required(0.05, 0.01, 24) == pytest.approx(4 * base, rel=0.01)
    assert n_required(0.1, 0.01, 48) / base == pytest.approx(
        (48 * np.log(2) + np.log(100)) / (24 * np.log(2) + np.log(100)), rel=0.01
    )


@pytest.mark.parametrize("bad", [0, -1])
def test_bad_support_raises(bad):
    with pytest.raises(ValueError):
        epsilon_bound(10, 0.01, bad)
    with pytest.raises(ValueError):
        delta_bound(10, 0.1, bad)


@pytest.mark.parametrize("bad_delta", [0.0, 1.0, -0.5, 2.0])
def test_bad_delta_raises(bad_delta):
    with pytest.raises(ValueError):
        epsilon_bound(10, bad_delta, 5)
    with pytest.raises(ValueError):
        n_required(0.1, bad_delta, 5)


def test_bad_eps_raises():
    with pytest.raises(ValueError):
        n_required(0.0, 0.01, 5)


@given(
    n=st.integers(min_value=1, max_value=10**7),
    d=st.integers(min_value=1, max_value=500),
    delta=st.floats(min_value=1e-9, max_value=0.999),
)
@settings(max_examples=200, deadline=None)
def test_inversion_property(n, d, delta):
    eps = epsilon_bound(n, delta, d)
    assert eps > 0
    assert delta_bound(n, eps, d) == pytest.approx(min(1.0, delta), rel=1e-6)


# -- statistical coverage ---------------------------------------------------


@pytest.mark.parametrize(
    "d,n", [(5, 200), (24, 1_000), (24, 5_000), (161, 20_000)]
)
def test_empirical_coverage(d, n):
    """The deviation ε(n, δ) is violated at rate ≤ δ (it is an upper
    bound, typically loose — we only check the guarantee direction)."""
    rng = np.random.default_rng(12345)
    delta = 0.05
    eps = epsilon_bound(n, delta, d)
    p = rng.dirichlet(np.ones(d) * 2)
    trials = 300
    fails = 0
    for _ in range(trials):
        emp = rng.multinomial(n, p) / n
        if np.abs(emp - p).sum() >= eps:
            fails += 1
    assert fails / trials <= delta + 0.03


@pytest.mark.parametrize("d", [5, 24])
def test_bound_not_vacuous(d):
    """ε(n, δ) should come within ~4× of typical deviations (sanity that
    the constant is usable, echoing the paper's optimality claim)."""
    rng = np.random.default_rng(7)
    n = 20_000
    p = np.full(d, 1.0 / d)
    typ = np.mean(
        [np.abs(rng.multinomial(n, p) / n - p).sum() for _ in range(50)]
    )
    assert epsilon_bound(n, 0.01, d) < 6 * typ


# -- §3.4 tightness vs the Waggoner-style bound ------------------------------


@pytest.mark.parametrize("d", [5, 12, 24, 64, 161])
def test_tighter_than_waggoner_style(d):
    """Figure 4's claim: the paper's bound needs a smaller ε (hence
    fewer samples for the same ε) than the E+McDiarmid route."""
    assert bound_ratio(d, delta=0.01) < 1.0


@pytest.mark.parametrize("d", [12, 24, 64])
def test_sample_savings_substantial(d):
    """In sample terms (ratio²) the saving is tens of percent at the
    paper's cardinalities (largest at small-to-moderate d, cf. Fig. 4)."""
    assert bound_ratio(d, delta=0.01) ** 2 < 0.85
    assert bound_ratio(24, delta=0.01) ** 2 < 0.7


def test_waggoner_matches_construction():
    n, d, delta = 1000, 24, 0.01
    expected = np.sqrt(d / n) + np.sqrt(2 * np.log(1 / delta) / n)
    assert epsilon_bound_waggoner(n, delta, d) == pytest.approx(expected)
