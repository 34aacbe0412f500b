"""Error metrics used throughout the evaluation section.

The paper reports *relative aggregation error* (mean over the training
days), *relative forecast error* (mean over the forecast horizon) and
*forecast interval width* (mean over the horizon, normalized by the true
value so widths are comparable across tasks).
"""
from __future__ import annotations

import numpy as np


def relative_forecast_error(pred: np.ndarray, truth: np.ndarray) -> float:
    """Mean |ŷ_h - y_h| / y_h over the horizon (zero-truth days skipped)."""
    pred, truth = np.asarray(pred, float), np.asarray(truth, float)
    mask = truth != 0
    if not mask.any():
        return 0.0 if np.allclose(pred, 0) else float("inf")
    return float(np.mean(np.abs(pred[mask] - truth[mask]) / np.abs(truth[mask])))


def relative_interval_width(
    lower: np.ndarray, upper: np.ndarray, truth: np.ndarray
) -> float:
    """Mean (upper - lower) / y over the horizon (zero-truth days skipped)."""
    lower, upper, truth = (np.asarray(a, float) for a in (lower, upper, truth))
    mask = truth != 0
    if not mask.any():
        return float("inf")
    return float(np.mean((upper[mask] - lower[mask]) / np.abs(truth[mask])))
