"""Tests for the Eq. 20 estimation-error metric."""
import numpy as np
import pytest

from repro.core.accuracy import eq20_accuracy, eq20_error


def test_perfect_estimation_zero_error():
    assert eq20_error([1.0, 2.0, 3.0], [1.0, 2.0, 3.0]) == 0.0


def test_constant_bias_zero_error():
    """Eq. 20 uses STD of the ratios, so a constant multiplicative bias is
    invisible (the paper measures curve-shape fidelity)."""
    assert eq20_error([1.0, 2.0, 3.0], [2.0, 4.0, 6.0]) == pytest.approx(0.0)


def test_known_std():
    # ratios R/R' - 1 = [-0.1, +0.1] → std = 0.1 → E = 1 - 1/1.1
    e = eq20_error([0.9, 1.1], [1.0, 1.0])
    assert e == pytest.approx(1 - 1 / 1.1)


def test_accuracy_complement():
    m, est = [1.0, 1.3], [1.1, 1.2]
    assert eq20_accuracy(m, est) == pytest.approx(1 - eq20_error(m, est))


def test_error_in_unit_interval():
    rng = np.random.default_rng(0)
    m = rng.uniform(0.5, 2, 20)
    e = rng.uniform(0.5, 2, 20)
    assert 0 <= eq20_error(m, e) < 1


def test_mismatched_lengths_raise():
    with pytest.raises(ValueError):
        eq20_error([1.0], [1.0, 2.0])


def test_empty_raises():
    with pytest.raises(ValueError):
        eq20_error([], [])
