"""The paper's estimation-error metric (Eq. 20).

``E = 1 - (1 + STD(R/R' - 1))^-1`` where R are measured values and R' the
model's estimates across a sweep (e.g. of error bounds). Accuracy = 1 - E.
Used for every column of Table II.
"""
from __future__ import annotations

import numpy as np

__all__ = ["eq20_error", "eq20_accuracy"]


def eq20_error(measured, estimated) -> float:
    """Estimation error per Eq. 20 (0 = perfect)."""
    r = np.asarray(measured, dtype=np.float64)
    rp = np.asarray(estimated, dtype=np.float64)
    if r.shape != rp.shape or r.size == 0:
        raise ValueError("measured/estimated must be equal-length, non-empty")
    rel = r / rp - 1.0
    return float(1.0 - 1.0 / (1.0 + np.std(rel)))


def eq20_accuracy(measured, estimated) -> float:
    return 1.0 - eq20_error(measured, estimated)
