"""`RatioQualityModel` — the paper's model as a single per-chunk object.

Construction performs the **one-time ~1% sampling** (the only pass over the
data besides an exact min/max); every subsequent estimate — for any error
bound or target bit-rate — costs only a histogram over the sample. This is
what replaces the trial-and-error compress-measure loop (§V-D).
"""
from __future__ import annotations

import numpy as np

from ..compressor.huffman import codebook_bytes
from ..compressor.pipeline import HEADER_BYTES
from ..compressor.predictors import get_predictor
from . import histogram, quality_model, ratio_model
from .ratio_model import MODEL_C1_BITS
from .sampling import sample_values

__all__ = ["RatioQualityModel"]


class RatioQualityModel:
    """Ratio-quality estimates for one data chunk and one predictor."""

    def __init__(
        self,
        data: np.ndarray,
        predictor: str = "lorenzo",
        sample_rate: float = 0.01,
        seed: int = 0,
        c1_bits: float = MODEL_C1_BITS,
        correction: str | None = "phase",
    ):
        """``correction`` selects the histogram correction layer: "phase"
        (default; see core.histogram), "eq9" (paper-literal Eq. 9), or None
        (raw sampled histogram)."""
        pred = get_predictor(predictor)
        self.predictor = predictor
        self.shape = tuple(data.shape)
        self.ndim = len(self.shape)
        self.n_points = int(np.prod(self.shape))
        self.coded_count = pred.coded_count(self.shape)
        self.side_bytes = pred.side_bytes(self.shape)
        self.c1_bits = float(c1_bits)
        if correction not in ("phase", "eq9", None):
            raise ValueError(f"unknown correction {correction!r}")
        self.correction = correction
        s = pred.sample_errors(data, rate=sample_rate, seed=seed)
        self.errors, self.weights = s.errors, s.weights
        self.group_ids = s.group_ids
        d = np.asarray(data, dtype=np.float64)
        self.vmin, self.vmax = float(d.min()), float(d.max())
        self.value_range = self.vmax - self.vmin
        self.values_sample = sample_values(data, rate=sample_rate, seed=seed + 1)
        self.sigma_d2 = float(self.values_sample.var())

    # ------------------------------------------------------------------
    def abs_bound(self, eb_rel: float) -> float:
        """Value-range-relative → absolute error bound."""
        return eb_rel * self.value_range

    def _hist(self, eb_abs: float):
        if self.correction == "phase":
            alpha = histogram.phase_alpha(self.predictor, self.ndim)
            return histogram.phase_smear(self.errors, self.weights, eb_abs, alpha)
        syms, cnts = histogram.code_histogram(self.errors, self.weights, eb_abs)
        if self.correction == "eq9":
            syms, cnts = histogram.bin_transfer(syms, cnts, self.predictor)
        return syms, cnts

    def _sigma_e2(self, eb_abs: float, uniform_only: bool = False) -> float:
        """Predictor-aware Eq. 10/11 error-distribution variance."""
        if uniform_only:
            return quality_model.sigma_e2_uniform(eb_abs)
        if self.predictor == "lorenzo":
            # lattice quantizer: every point's error is its phase residual
            return quality_model.sigma_e2_lattice(self.values_sample, eb_abs)
        if self.predictor == "interp" and self.group_ids is not None:
            return quality_model.sigma_e2_interp(
                self.errors, self.weights, self.group_ids, eb_abs
            )
        return quality_model.sigma_e2(self.errors, self.weights, eb_abs)

    def _overhead_bits(self, n_symbols: int) -> float:
        return 8.0 * (codebook_bytes(n_symbols) + self.side_bytes + HEADER_BYTES)

    # ------------------------------------------------------------------
    def estimate(self, eb_abs: float, uniform_only: bool = False) -> dict:
        """All ratio/quality estimates for one absolute error bound.

        ``uniform_only=True`` reproduces the prior-work baseline that models
        the error distribution as purely uniform (Eq. 10 without Eq. 11 —
        the dashed lines of Figs. 6/8).
        """
        syms, cnts = self._hist(eb_abs)
        p0 = histogram.p0_of(syms, cnts)
        b_code = ratio_model.huffman_bitrate(cnts)
        b_code_ll = ratio_model.lossless_bitrate(b_code, p0, self.c1_bits)
        oh = self._overhead_bits(len(syms))
        bitrate_huff = (b_code * self.coded_count + oh) / self.n_points
        bitrate_ll = (b_code_ll * self.coded_count + oh) / self.n_points
        s2 = self._sigma_e2(eb_abs, uniform_only)
        return {
            "eb_abs": float(eb_abs),
            "p0": p0,
            "bitrate_huff": bitrate_huff,
            "bitrate_ll": bitrate_ll,
            "rle_ratio": ratio_model.rle_ratio(p0, b_code, self.c1_bits),
            "ratio_huff": 32.0 / bitrate_huff if bitrate_huff > 0 else float("inf"),
            "ratio_ll": 32.0 / bitrate_ll if bitrate_ll > 0 else float("inf"),
            "sigma_e2": s2,
            "psnr": quality_model.psnr_est(self.value_range, s2),
            "ssim": quality_model.ssim_est(self.sigma_d2, s2, self.value_range),
        }

    def estimate_many(self, ebs_abs) -> list[dict]:
        return [self.estimate(e) for e in ebs_abs]

    # ------------------------------------------------------------------
    def error_bound_for_bitrate(self, target_bits_per_point: float, lossless: bool = True) -> float:
        """Invert the model: error bound achieving a target bit-rate
        (fix-rate mode, use-case 2). Pure model evaluations — no compression."""
        key = "bitrate_ll" if lossless else "bitrate_huff"

        def est(eb):
            return self.estimate(eb)[key]

        lo = max(self.value_range * 1e-8, np.finfo(np.float64).tiny)
        hi = max(self.value_range, lo * 10)
        return ratio_model.invert_bitrate(est, target_bits_per_point, lo, hi)

    def error_bound_for_psnr(self, target_psnr_db: float) -> float:
        """Invert the quality model: largest error bound whose estimated
        PSNR still meets ``target_psnr_db`` (in-situ use-case 3). Bisection
        on the model's (monotone) PSNR(eb) curve — again pure model
        evaluations on the sample."""
        lo = max(self.value_range * 1e-9, np.finfo(np.float64).tiny)
        hi = max(self.value_range, lo * 10)
        if self.estimate(hi)["psnr"] >= target_psnr_db:
            return hi
        if self.estimate(lo)["psnr"] < target_psnr_db:
            return lo
        for _ in range(60):
            mid = float(np.sqrt(lo * hi))
            if self.estimate(mid)["psnr"] >= target_psnr_db:
                lo = mid
            else:
                hi = mid
            if hi / lo < 1.001:
                break
        return lo

    def error_bound_for_mse(self, target_mse: float) -> float:
        """Largest error bound whose estimated error variance stays at or
        below ``target_mse``. Used when the quality target is expressed
        against a *global* peak (e.g. a snapshot-level PSNR floor while this
        model only sees one rank's partition): the caller converts the
        global PSNR to an MSE budget, which is range-free."""
        lo = max(self.value_range * 1e-9, np.finfo(np.float64).tiny)
        hi = max(self.value_range, lo * 10)
        if self._sigma_e2(hi) <= target_mse:
            return hi
        if self._sigma_e2(lo) > target_mse:
            return lo
        for _ in range(60):
            mid = float(np.sqrt(lo * hi))
            if self._sigma_e2(mid) <= target_mse:
                lo = mid
            else:
                hi = mid
            if hi / lo < 1.001:
                break
        return lo

    def estimate_fft(self, eb_abs: float, pk: np.ndarray, modes_per_bin: np.ndarray, uniform_only: bool = False) -> float:
        """Estimated FFT power-spectrum distortion (§III-E-4) given the
        original data's radial spectrum (one-time analysis setup)."""
        s2 = self._sigma_e2(eb_abs, uniform_only)
        return quality_model.fft_rel_error_est(s2, self.n_points, pk, modes_per_bin)
