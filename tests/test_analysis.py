"""Tests for the post-hoc analysis metrics (measured side of §III-E)."""
import numpy as np
import pytest

from repro import analysis


def test_psnr_identical_infinite():
    d = np.random.default_rng(0).normal(size=(16, 16))
    assert analysis.psnr(d, d) == float("inf")


def test_psnr_known_value():
    d = np.array([0.0, 1.0])  # range 1
    r = np.array([0.1, 1.0])  # mse 0.005
    assert analysis.psnr(d, r) == pytest.approx(10 * np.log10(1 / 0.005))


def test_psnr_decreases_with_noise():
    rng = np.random.default_rng(1)
    d = rng.normal(size=(32, 32))
    a = analysis.psnr(d, d + rng.normal(size=d.shape) * 0.01)
    b = analysis.psnr(d, d + rng.normal(size=d.shape) * 0.1)
    assert a > b


def test_ssim_identical_is_one():
    d = np.random.default_rng(2).normal(size=(32, 32))
    assert analysis.ssim_global(d, d) == pytest.approx(1.0)


def test_ssim_bounded_and_decreasing():
    rng = np.random.default_rng(3)
    d = rng.normal(size=(32, 32))
    s1 = analysis.ssim_global(d, d + rng.normal(size=d.shape) * 0.05)
    s2 = analysis.ssim_global(d, d + rng.normal(size=d.shape) * 0.5)
    assert 0 < s2 < s1 <= 1.0


def test_value_range():
    assert analysis.value_range(np.array([-2.0, 3.0])) == 5.0


def test_power_spectrum_peak_at_injected_frequency():
    n = 64
    x = np.arange(n)
    d = np.sin(2 * np.pi * 8 * x / n)  # wavenumber 8
    k, pk, cnt = analysis.power_spectrum(d)
    assert k[np.argmax(pk)] == pytest.approx(8.0, abs=0.5)


def test_power_spectrum_parseval_sanity():
    """Total binned power is positive and finite for a random field."""
    d = np.random.default_rng(4).normal(size=(16, 16, 16))
    k, pk, cnt = analysis.power_spectrum(d)
    assert np.isfinite(pk).all() and (pk >= 0).all()
    assert (cnt > 0).all()


def test_spectrum_rel_error_zero_for_identical():
    d = np.random.default_rng(5).normal(size=(16, 16))
    assert analysis.spectrum_rel_error(d, d) == 0.0


def test_spectrum_rel_error_grows_with_noise():
    rng = np.random.default_rng(6)
    d = rng.normal(size=(16, 16, 16))
    a = analysis.spectrum_rel_error(d, d + rng.normal(size=d.shape) * 0.01)
    b = analysis.spectrum_rel_error(d, d + rng.normal(size=d.shape) * 0.3)
    assert a < b
