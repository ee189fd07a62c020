"""Ridge linear regression over the covar matrix (paper §2, §4.2).

The gradient of the ridge least-squares objective depends on the data only
through the non-centered covar matrix Sigma (the paper's "second approach"
[46]): grad_k J = (Sigma theta_full)_k / N + lambda theta_k with the label's
coefficient pinned to -1. Batch gradient descent with Armijo backtracking
line search therefore runs entirely on the (tiny) covar matrix — one LMFAO
batch, then convergence without touching the data again. The closed-form
solution over the same matrix is the MADlib-OLS stand-in used to check
accuracy.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.apps.covar import CovarMatrix


@dataclass
class LinRegModel:
    """Learned parameters, aligned with the covar-matrix feature index."""

    cm: CovarMatrix
    theta: np.ndarray  # over the p-1 non-label columns
    lambda_: float
    iterations: int

    def predict(self, X: np.ndarray) -> np.ndarray:
        return X @ self.theta

    def rmse(self, X: np.ndarray, y: np.ndarray) -> float:
        return float(np.sqrt(np.mean((self.predict(X) - y) ** 2)))


def _objective(cm: CovarMatrix, theta: np.ndarray, lam: float, yi: int) -> float:
    full = np.insert(theta, yi, -1.0)
    return float(full @ cm.sigma @ full) / (2 * cm.n) + lam / 2 * float(
        theta @ theta
    )


def learn_bgd(
    cm: CovarMatrix,
    label: str,
    *,
    lambda_: float = 1e-3,
    max_iters: int = 10_000,
    tol: float = 1e-18,
) -> LinRegModel:
    """Batch gradient descent with Armijo backtracking line search and
    Barzilai-Borwein step sizes — the paper's optimizer (§B, following
    AC/DC [4]). BB steps are essential: one-hot blocks make Sigma nearly
    singular, and fixed-step GD stalls."""
    yi = cm.index[label]
    feat = [i for i in range(cm.p) if i != yi]
    theta = np.zeros(cm.p - 1)
    prev_theta: np.ndarray | None = None
    prev_grad: np.ndarray | None = None
    gscale = max(1.0, float(np.trace(cm.sigma)) / cm.n)
    it = 0
    for it in range(1, max_iters + 1):
        full = np.insert(theta, yi, -1.0)
        grad = (cm.sigma @ full)[feat] / cm.n + lambda_ * theta
        gnorm2 = float(grad @ grad)
        if gnorm2 < tol * gscale:
            break
        step = None
        if prev_grad is not None:
            s = theta - prev_theta
            yv = grad - prev_grad
            sy = float(s @ yv)
            if sy > 1e-30:
                step = float(s @ s) / sy  # BB1 (spectral) step
        if step is None or not np.isfinite(step) or step <= 0:
            # Armijo backtracking fallback (first iteration / bad curvature)
            j0 = _objective(cm, theta, lambda_, yi)
            step = 1.0 / gscale
            while step > 1e-16:
                cand = theta - step * grad
                if _objective(cm, cand, lambda_, yi) <= j0 - 0.5 * step * gnorm2:
                    break
                step /= 2.0
        prev_theta, prev_grad = theta, grad
        theta = theta - step * grad
    return LinRegModel(cm, theta, lambda_, it)


def learn_closed_form(
    cm: CovarMatrix, label: str, *, lambda_: float = 1e-3
) -> LinRegModel:
    """Ridge normal equations over the covar matrix (MADlib-OLS stand-in)."""
    yi = cm.index[label]
    feat = [i for i in range(cm.p) if i != yi]
    sxx = cm.sigma[np.ix_(feat, feat)] / cm.n
    sxy = cm.sigma[feat, yi] / cm.n
    theta = np.linalg.solve(sxx + lambda_ * np.eye(len(feat)), sxy)
    return LinRegModel(cm, theta, lambda_, 0)
