"""Sampling theory of paper §7: violation-rate estimation and thresholds."""
from .estimator import chebyshev_bound, inv_norm_cdf, normal_ci_halfwidth, p_hat, z_value
from .threshold import F1Prime, accept_on_sample, sample_epsilon

__all__ = [
    "F1Prime", "accept_on_sample", "chebyshev_bound", "inv_norm_cdf",
    "normal_ci_halfwidth", "p_hat", "sample_epsilon", "z_value",
]
