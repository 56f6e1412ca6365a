"""Nelder–Mead simplex minimizer (substrate).

The paper (§3.2, §4.5) solves the minimax sample-allocation objectives
(Eq. 10 / Eq. 11) with the Nelder–Mead simplex algorithm. scipy is not
available offline, so we implement the standard algorithm (reflection,
expansion, contraction, shrink) from scratch in numpy.

The implementation follows the textbook parameterization
(alpha=1, gamma=2, rho=0.5, sigma=0.5) with adaptive initial simplex.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import numpy as np


@dataclass
class NMResult:
    """Result of a Nelder–Mead run.

    Attributes:
        x: the best point found.
        fun: objective value at ``x``.
        n_iter: iterations performed.
        converged: whether the simplex collapsed below tolerance.
    """

    x: np.ndarray
    fun: float
    n_iter: int
    converged: bool


def nelder_mead(
    f: Callable[[np.ndarray], float],
    x0: np.ndarray,
    *,
    max_iter: int = 2000,
    xatol: float = 1e-8,
    fatol: float = 1e-10,
    initial_step: float = 0.1,
) -> NMResult:
    """Minimize ``f`` starting from ``x0`` with the Nelder–Mead simplex.

    Args:
        f: objective; must accept a 1-D numpy array and return a float.
        x0: starting point (1-D array).
        max_iter: iteration cap.
        xatol: simplex-diameter convergence tolerance.
        fatol: objective-spread convergence tolerance.
        initial_step: per-coordinate perturbation used to build the
            initial simplex (relative when the coordinate is nonzero).

    Returns:
        NMResult with the best vertex found.
    """
    x0 = np.asarray(x0, dtype=float).ravel()
    n = x0.size
    # Build initial simplex: x0 plus n perturbed vertices.
    simplex = np.tile(x0, (n + 1, 1))
    for i in range(n):
        step = initial_step * abs(x0[i]) if x0[i] != 0 else initial_step
        simplex[i + 1, i] += step
    fvals = np.array([f(v) for v in simplex], dtype=float)

    alpha, gamma, rho, sigma = 1.0, 2.0, 0.5, 0.5
    n_iter = 0
    converged = False
    while n_iter < max_iter:
        order = np.argsort(fvals)
        simplex, fvals = simplex[order], fvals[order]
        if (
            np.max(np.abs(simplex[1:] - simplex[0])) <= xatol
            and np.max(np.abs(fvals[1:] - fvals[0])) <= fatol
        ):
            converged = True
            break
        centroid = simplex[:-1].mean(axis=0)
        worst = simplex[-1]
        # Reflection.
        xr = centroid + alpha * (centroid - worst)
        fr = f(xr)
        if fvals[0] <= fr < fvals[-2]:
            simplex[-1], fvals[-1] = xr, fr
        elif fr < fvals[0]:
            # Expansion.
            xe = centroid + gamma * (xr - centroid)
            fe = f(xe)
            if fe < fr:
                simplex[-1], fvals[-1] = xe, fe
            else:
                simplex[-1], fvals[-1] = xr, fr
        else:
            # Contraction (outside if reflected beat worst, else inside).
            if fr < fvals[-1]:
                xc = centroid + rho * (xr - centroid)
            else:
                xc = centroid + rho * (worst - centroid)
            fc = f(xc)
            if fc < min(fr, fvals[-1]):
                simplex[-1], fvals[-1] = xc, fc
            else:
                # Shrink toward the best vertex.
                simplex[1:] = simplex[0] + sigma * (simplex[1:] - simplex[0])
                fvals[1:] = np.array([f(v) for v in simplex[1:]])
        n_iter += 1

    best = int(np.argmin(fvals))
    return NMResult(
        x=simplex[best].copy(), fun=float(fvals[best]), n_iter=n_iter, converged=converged
    )


def softmax(x: np.ndarray) -> np.ndarray:
    """Numerically stable softmax, used to parameterize the simplex
    constraint Λ ∈ [0,1]^G, ΣΛ=1 as an unconstrained problem."""
    x = np.asarray(x, dtype=float)
    z = x - x.max()
    e = np.exp(z)
    return e / e.sum()


def minimize_on_simplex(
    f: Callable[[np.ndarray], float],
    n_dims: int,
    *,
    x0: np.ndarray | None = None,
    max_iter: int = 2000,
) -> np.ndarray:
    """Minimize ``f(Λ)`` over the probability simplex of dimension ``n_dims``.

    The paper optimizes Eq. 10/11 over Λ with ΣΛ=1 via Nelder–Mead; we
    reparameterize through a softmax so the search is unconstrained,
    which keeps the simplex constraint exactly satisfied at every
    evaluation.

    Returns:
        The optimal allocation Λ (sums to 1).
    """
    if x0 is None:
        x0 = np.zeros(n_dims)
    res = nelder_mead(lambda t: f(softmax(t)), np.asarray(x0, float), max_iter=max_iter,
                      initial_step=0.5)
    return softmax(res.x)
