"""Acquisition functions: EI, constrained EI (EIC), and the safe region.

Implements Eq. 3 (Expected Improvement, minimization form), Eq. 6–7
(EIC: EI × probability of satisfying each constraint, from runtime/
constraint surrogates) and Eq. 8 (safe region via the GP upper bound
``u(x) = mu(x) + gamma * sigma(x) <= threshold``). No scipy offline:
the standard normal CDF uses ``math.erf``.
"""
from __future__ import annotations

import math

import numpy as np

_erf = np.vectorize(math.erf, otypes=[np.float64])


def norm_pdf(z: np.ndarray) -> np.ndarray:
    z = np.asarray(z, dtype=np.float64)
    return np.exp(-0.5 * z**2) / math.sqrt(2.0 * math.pi)


def norm_cdf(z: np.ndarray) -> np.ndarray:
    z = np.asarray(z, dtype=np.float64)
    return 0.5 * (1.0 + _erf(z / math.sqrt(2.0)))


def expected_improvement(
    mu: np.ndarray, sigma: np.ndarray, best: float
) -> np.ndarray:
    """EI for *minimization*: E[max(best - y, 0)] under N(mu, sigma^2)."""
    sigma = np.maximum(np.asarray(sigma, dtype=np.float64), 1e-12)
    gamma = (best - np.asarray(mu, dtype=np.float64)) / sigma
    return sigma * (gamma * norm_cdf(gamma) + norm_pdf(gamma))


def prob_below(mu: np.ndarray, sigma: np.ndarray, threshold: float) -> np.ndarray:
    """Pr[y <= threshold] under the GP posterior (Eq. 7)."""
    sigma = np.maximum(np.asarray(sigma, dtype=np.float64), 1e-12)
    return norm_cdf((threshold - np.asarray(mu, dtype=np.float64)) / sigma)


def eic(
    mu: np.ndarray,
    sigma: np.ndarray,
    best: float,
    constraint_posteriors: list[tuple[np.ndarray, np.ndarray, float]],
) -> np.ndarray:
    """EIC(x) = EI(x) * prod_c Pr[c(x) <= threshold_c] (Eq. 6)."""
    a = expected_improvement(mu, sigma, best)
    for c_mu, c_sigma, thr in constraint_posteriors:
        a = a * prob_below(c_mu, c_sigma, thr)
    return a


def safe_mask(
    mu: np.ndarray, sigma: np.ndarray, threshold: float, gamma: float = 1.0
) -> np.ndarray:
    """Safe-region membership: mu + gamma*sigma <= threshold (Eq. 8)."""
    if not 0.0 < gamma <= 1.0:
        raise ValueError("gamma must be in (0, 1]")
    return (np.asarray(mu) + gamma * np.asarray(sigma)) <= threshold
