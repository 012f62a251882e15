"""Benchmarks behind Table II: the model's one-time sampling + per-bound
estimation vs the measured (trial) pass it replaces, at bench scale."""
import pytest

from repro import sci_data
from repro.compressor import pipeline
from repro.config import EB_SWEEP_REL
from repro.core.model import RatioQualityModel


@pytest.fixture(scope="module")
def rtm():
    return sci_data.generate("RTM", "2000", "bench")


@pytest.fixture(scope="module")
def vrange(rtm):
    return float(rtm.max() - rtm.min())


@pytest.mark.parametrize("pred", ["lorenzo", "interp", "regression"])
def test_model_build(benchmark, rtm, pred):
    """One-time 1% sampling pass (the model's only data-dependent cost)."""
    benchmark(RatioQualityModel, rtm, pred, 0.01, 7)


def test_model_estimate_sweep(benchmark, rtm, vrange):
    """All 7 error-bound estimates from one built model."""
    m = RatioQualityModel(rtm, "lorenzo", seed=7)

    def sweep():
        return [m.estimate(r * vrange) for r in EB_SWEEP_REL]

    benchmark(sweep)


def test_trial_single_eb(benchmark, rtm, vrange):
    """One trial-and-error unit: full compress + decompress + analysis."""
    benchmark(pipeline.measure, rtm, "lorenzo", 1e-3 * vrange)


def test_model_invert_bitrate(benchmark, rtm):
    m = RatioQualityModel(rtm, "lorenzo", seed=7)
    benchmark(m.error_bound_for_bitrate, 2.0)


def test_model_invert_psnr(benchmark, rtm):
    m = RatioQualityModel(rtm, "lorenzo", seed=7)
    benchmark(m.error_bound_for_psnr, 56.0)
