"""Ridge regression (closed form) — the paper's 'SVR' stand-in.

A linear-kernel SVR and ridge regression both fit a regularised linear
function; ridge has a closed-form solution needing no QP solver (none is
installed offline). Substitution documented in DESIGN.md. Features are
standardised internally so the regulariser is scale-free.
"""
from __future__ import annotations

import numpy as np


class RidgeRegressor:
    def __init__(self, alpha: float = 1.0):
        self.alpha = alpha
        self.coef_: np.ndarray | None = None
        self.intercept_: float = 0.0

    def fit(self, X, y) -> "RidgeRegressor":
        X = np.asarray(X, dtype=float)
        y = np.asarray(y, dtype=float).ravel()
        self._mu = X.mean(axis=0)
        self._sigma = X.std(axis=0)
        self._sigma[self._sigma == 0] = 1.0
        Z = (X - self._mu) / self._sigma
        self._ymu = float(y.mean())
        yc = y - self._ymu
        d = Z.shape[1]
        A = Z.T @ Z + self.alpha * np.eye(d)
        self.coef_ = np.linalg.solve(A, Z.T @ yc)
        self.intercept_ = self._ymu
        return self

    def predict(self, X) -> np.ndarray:
        X = np.asarray(X, dtype=float)
        Z = (X - self._mu) / self._sigma
        return Z @ self.coef_ + self.intercept_
