"""Gaussian-process surrogate with mixed kernels (Eq. 2 and Eq. 4).

The paper models objective/constraint responses with a GP whose kernel
mixes a Matérn-5/2 over numerical parameters, a Hamming kernel over
categorical parameters, and a squared-exponential over the (log) data
size appended as an extra input — this is how dynamic workloads are
supported online. Inputs live in the unit cube (see
:class:`repro.core.config_space.ConfigSpace`); targets are standardized
internally. Hyperparameters (amplitude, shared numeric lengthscale,
categorical decay, noise) are fit by grid-maximizing the exact log
marginal likelihood — observation counts are tiny online (≤ tens), so
a coarse grid is both robust and fast, and needs no scipy.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

_JITTER = 1e-8


def _matern52(d: np.ndarray) -> np.ndarray:
    """Matérn-5/2 of scaled distances ``d``."""
    s = np.sqrt(5.0) * d
    return (1.0 + s + s**2 / 3.0) * np.exp(-s)


def _pairwise_sq(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    return np.maximum(
        (a**2).sum(1)[:, None] + (b**2).sum(1)[None, :] - 2.0 * a @ b.T, 0.0
    )


@dataclass
class MixedKernel:
    """Product kernel: Matérn52(numeric) × Hamming(categorical) × SE(size).

    ``cat_mask`` marks categorical dims of the config vector; the data
    size, if used, is the final column of the input matrix and is
    handled by the SE factor.
    """

    cat_mask: np.ndarray
    has_datasize: bool = False
    lengthscale: float = 0.5
    cat_decay: float = 0.5
    ds_lengthscale: float = 0.5

    def __call__(self, A: np.ndarray, B: np.ndarray) -> np.ndarray:
        d = len(self.cat_mask)
        num = ~self.cat_mask
        An, Bn = A[:, :d][:, num], B[:, :d][:, num]
        K = _matern52(np.sqrt(_pairwise_sq(An, Bn)) / max(self.lengthscale, 1e-6))
        if self.cat_mask.any():
            Ac, Bc = A[:, :d][:, self.cat_mask], B[:, :d][:, self.cat_mask]
            mism = (np.abs(Ac[:, None, :] - Bc[None, :, :]) > 1e-9).sum(axis=2)
            K = K * np.exp(-mism / max(self.cat_decay, 1e-6))
        if self.has_datasize:
            ds_a, ds_b = A[:, d:], B[:, d:]
            K = K * np.exp(
                -_pairwise_sq(ds_a, ds_b) / (2.0 * max(self.ds_lengthscale, 1e-6) ** 2)
            )
        return K


@dataclass
class GaussianProcess:
    """Zero-mean GP regression with the mixed kernel and white noise.

    ``fit`` selects hyperparameters on a small grid by log marginal
    likelihood; ``predict`` returns the posterior mean and standard
    deviation in the original target units.
    """

    cat_mask: np.ndarray
    has_datasize: bool = False
    noise_grid: tuple[float, ...] = (1e-4, 1e-3, 1e-2, 1e-1)
    ls_grid: tuple[float, ...] = (0.15, 0.3, 0.6, 1.2)
    _X: np.ndarray | None = None
    _alpha: np.ndarray | None = None
    _L: np.ndarray | None = None
    _y_mean: float = 0.0
    _y_std: float = 1.0
    kernel: MixedKernel = field(init=False)
    noise: float = 1e-3

    def __post_init__(self) -> None:
        self.kernel = MixedKernel(np.asarray(self.cat_mask, bool), self.has_datasize)

    def fit(self, X: np.ndarray, y: np.ndarray) -> "GaussianProcess":
        X = np.atleast_2d(np.asarray(X, dtype=np.float64))
        y = np.asarray(y, dtype=np.float64)
        self._y_mean = float(y.mean())
        self._y_std = float(y.std()) or 1.0
        z = (y - self._y_mean) / self._y_std
        best = (-np.inf, None)
        # pairwise distances grow ~sqrt(d) in the unit cube, so the
        # candidate lengthscales must scale with dimensionality or a
        # high-d GP collapses to its prior mean between observations
        dim_scale = max(np.sqrt((~np.asarray(self.cat_mask, bool)).sum() / 2.0), 1.0)
        # same story for the Hamming factor: its decay must scale with
        # the categorical-dimension count or every config pair is "far"
        self.kernel.cat_decay = max(float(np.asarray(self.cat_mask).sum()) / 2.0, 0.5)
        for ls in tuple(self.ls_grid) + tuple(g * dim_scale for g in self.ls_grid):
            for nz in self.noise_grid:
                self.kernel.lengthscale = ls
                self.kernel.ds_lengthscale = ls
                K = self.kernel(X, X) + (nz + _JITTER) * np.eye(len(X))
                try:
                    L = np.linalg.cholesky(K)
                except np.linalg.LinAlgError:
                    continue
                a = np.linalg.solve(L.T, np.linalg.solve(L, z))
                lml = (
                    -0.5 * z @ a
                    - np.log(np.diag(L)).sum()
                    - 0.5 * len(X) * np.log(2 * np.pi)
                )
                if lml > best[0]:
                    best = (lml, (ls, nz, L, a))
        if best[1] is None:  # pathological: fall back to heavy noise
            ls, nz = 0.5, 1.0
            K = self.kernel(X, X) + (nz + _JITTER) * np.eye(len(X))
            L = np.linalg.cholesky(K)
            a = np.linalg.solve(L.T, np.linalg.solve(L, z))
            best = (0.0, (ls, nz, L, a))
        ls, nz, L, a = best[1]
        self.kernel.lengthscale = ls
        self.kernel.ds_lengthscale = ls
        self.noise = nz
        self._X, self._L, self._alpha = X, L, a
        return self

    def predict(self, X: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
        if self._X is None:
            raise RuntimeError("GP is not fitted")
        X = np.atleast_2d(np.asarray(X, dtype=np.float64))
        Ks = self.kernel(X, self._X)
        mu = Ks @ self._alpha
        v = np.linalg.solve(self._L, Ks.T)
        var = np.clip(self.kernel(X, X).diagonal() + self.noise - (v**2).sum(0), 1e-12, None)
        return (
            mu * self._y_std + self._y_mean,
            np.sqrt(var) * self._y_std,
        )
