"""§5.3 metrics: guarantee checkers and Δ_d."""
import numpy as np
import pytest

from repro.tables.metrics import delta_d, guarantee1_satisfied, guarantee2_satisfied

TAU = np.array([0.1, 0.2, 0.3, 0.9, 1.5])


def test_g1_exact_output_satisfies():
    assert guarantee1_satisfied([0, 1], TAU, 2, 0.05)


def test_g1_swap_within_eps_ok():
    # returned {0, 2} instead of {0, 1}: max returned τ = 0.3, missing
    # candidate 1 has τ = 0.2 → 0.1 gap < ε = 0.15
    assert guarantee1_satisfied([0, 2], TAU, 2, 0.15)


def test_g1_swap_beyond_eps_fails():
    assert not guarantee1_satisfied([0, 3], TAU, 2, 0.15)  # gap 0.7


def test_g1_wrong_size_raises():
    with pytest.raises(ValueError):
        guarantee1_satisfied([0], TAU, 2, 0.1)


def test_g2_close_histograms_pass():
    est = np.array([[50, 50], [10, 90]])
    tru = np.array([[52, 48], [11, 89]])
    assert guarantee2_satisfied([0, 1], est, tru, 0.1)


def test_g2_far_histogram_fails():
    est = np.array([[100, 0]])
    tru = np.array([[50, 50]])
    assert not guarantee2_satisfied([0], est, tru, 0.5)


def test_g2_boundary_strict():
    est = np.array([[60, 40]])
    tru = np.array([[50, 50]])  # deviation 0.2 (up to float rounding)
    assert not guarantee2_satisfied([0], est, tru, 0.19)
    assert guarantee2_satisfied([0], est, tru, 0.21)


def test_delta_d_zero_for_optimal():
    assert delta_d([1, 0], TAU, 2) == 0.0


def test_delta_d_positive_for_suboptimal():
    got = delta_d([0, 2], TAU, 2)
    assert got == pytest.approx((0.4 - 0.3) / 0.3)


def test_delta_d_wrong_size_raises():
    with pytest.raises(ValueError):
        delta_d([0], TAU, 2)


def test_delta_d_degenerate_zero_optimum():
    tau = np.array([0.0, 0.0, 1.0])
    assert delta_d([0, 1], tau, 2) == 0.0
    assert delta_d([0, 2], tau, 2) == float("inf")
