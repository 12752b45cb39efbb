"""From-scratch optimizers.

The evaluation environment ships no SciPy, so the two optimizers the paper
relies on are implemented here:

* :func:`gradient_descent` — first-order descent with Armijo backtracking
  line search, used with the paper's explicit gradient (Prop 4.7) for
  MCE/LCE/DCE/DCEr. The Eq-6 parameterization already bakes the symmetric
  doubly-stochastic constraints into the search space, so the problem is
  unconstrained in h (the paper's SLSQP plays the same role).
* :func:`nelder_mead` — the gradient-free simplex method for the Holdout
  baseline, whose objective (negative propagation accuracy) is a step
  function with no gradient (the paper uses scipy's Nelder-Mead for exactly
  this reason).
"""
from __future__ import annotations

from typing import Callable

import numpy as np

__all__ = ["gradient_descent", "nelder_mead", "OptResult"]


class OptResult:
    """Minimal scipy-like result: ``x``, ``fun``, ``nit``, ``converged``."""

    def __init__(self, x: np.ndarray, fun: float, nit: int, converged: bool):
        self.x = x
        self.fun = fun
        self.nit = nit
        self.converged = converged

    def __repr__(self) -> str:  # pragma: no cover - debug aid
        return f"OptResult(fun={self.fun:.3e}, nit={self.nit}, converged={self.converged})"


def gradient_descent(
    fun: Callable[[np.ndarray], float],
    grad: Callable[[np.ndarray], np.ndarray],
    x0: np.ndarray,
    *,
    max_iter: int = 2000,
    tol: float = 1e-12,
    lr0: float = 1.0,
    armijo_c: float = 1e-4,
    backtrack: float = 0.5,
    max_backtracks: int = 40,
) -> OptResult:
    """Backtracking-line-search gradient descent on an unconstrained problem.

    Stops when the step no longer reduces the objective by more than
    ``tol * max(1, |f|)`` (relative, so energy scale does not matter) or the
    gradient norm vanishes. Deterministic given ``x0``.
    """
    x = np.asarray(x0, dtype=float).copy()
    fx = fun(x)
    lr = lr0
    for it in range(1, max_iter + 1):
        g = grad(x)
        gnorm2 = float(g @ g)
        if gnorm2 < 1e-20:
            return OptResult(x, fx, it, True)
        step = lr
        for _ in range(max_backtracks):
            cand = x - step * g
            fc = fun(cand)
            if fc <= fx - armijo_c * step * gnorm2:
                break
            step *= backtrack
        else:
            return OptResult(x, fx, it, True)  # no descent direction progress
        improved = fx - fc
        x, fx = cand, fc
        lr = min(lr0, step / backtrack)  # warm-start next line search
        if improved < tol * max(1.0, abs(fx)):
            return OptResult(x, fx, it, True)
    return OptResult(x, fx, max_iter, False)


def nelder_mead(
    fun: Callable[[np.ndarray], float],
    x0: np.ndarray,
    *,
    step: float = 0.1,
    max_iter: int = 200,
    xatol: float = 1e-4,
    fatol: float = 1e-6,
) -> OptResult:
    """Standard Nelder-Mead simplex (reflection 1, expansion 2, contraction
    0.5, shrink 0.5) — mirrors scipy.optimize.minimize(method="Nelder-Mead")
    closely enough for the Holdout baseline's small k* dimensionality."""
    x0 = np.asarray(x0, dtype=float)
    ndim = len(x0)
    simplex = [x0]
    for i in range(ndim):
        p = x0.copy()
        p[i] += step if p[i] == 0 else step * max(abs(p[i]), 1.0)
        simplex.append(p)
    fvals = [fun(p) for p in simplex]
    nit = 0
    for nit in range(1, max_iter + 1):
        order = np.argsort(fvals)
        simplex = [simplex[i] for i in order]
        fvals = [fvals[i] for i in order]
        if (
            np.max([np.max(np.abs(p - simplex[0])) for p in simplex[1:]]) < xatol
            and np.max(np.abs(np.array(fvals[1:]) - fvals[0])) < fatol
        ):
            return OptResult(simplex[0], fvals[0], nit, True)
        centroid = np.mean(simplex[:-1], axis=0)
        worst = simplex[-1]
        xr = centroid + (centroid - worst)
        fr = fun(xr)
        if fvals[0] <= fr < fvals[-2]:
            simplex[-1], fvals[-1] = xr, fr
        elif fr < fvals[0]:
            xe = centroid + 2.0 * (centroid - worst)
            fe = fun(xe)
            if fe < fr:
                simplex[-1], fvals[-1] = xe, fe
            else:
                simplex[-1], fvals[-1] = xr, fr
        else:
            xc = centroid + 0.5 * (worst - centroid)
            fc = fun(xc)
            if fc < fvals[-1]:
                simplex[-1], fvals[-1] = xc, fc
            else:  # shrink toward best
                best = simplex[0]
                simplex = [best] + [best + 0.5 * (p - best) for p in simplex[1:]]
                fvals = [fvals[0]] + [fun(p) for p in simplex[1:]]
    order = np.argsort(fvals)
    return OptResult(simplex[order[0]], fvals[order[0]], nit, False)
