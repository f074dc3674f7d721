"""Theoretical results of the paper as executable code (§II-B, §III).

Implements Lemma 1, Theorem 2's convergence coefficient ``a``,
Theorem 3's initialization-strategy condition (Eq. 12) with the κ
coefficients from Appendix A, KL divergence, and the Fig. 1-style
scalar M-H simulation used to verify Theorem 3 empirically. Also the
exact transition distributions of the models (for sampler-correctness
tests).
"""
from __future__ import annotations

from typing import Optional

import numpy as np

from repro.core.abstraction import RandomWalkModel, WalkerBatch
from repro.graph.csr import CSRGraph


# ----------------------------------------------------------------------
# Basic quantities
# ----------------------------------------------------------------------
def kl_divergence(p: np.ndarray, q: np.ndarray, eps: float = 1e-12) -> float:
    """KL(p || q) with additive smoothing for empirical zero counts."""
    p = np.asarray(p, dtype=np.float64) + eps
    q = np.asarray(q, dtype=np.float64) + eps
    p = p / p.sum()
    q = q / q.sum()
    return float(np.sum(p * np.log(p / q)))


def tv_distance(p: np.ndarray, q: np.ndarray) -> float:
    """Total variation distance between two discrete distributions."""
    p = np.asarray(p, dtype=np.float64)
    q = np.asarray(q, dtype=np.float64)
    p = p / max(p.sum(), 1e-300)
    q = q / max(q.sum(), 1e-300)
    return float(0.5 * np.abs(p - q).sum())


def lemma1_holds(pi: np.ndarray) -> bool:
    """Lemma 1: any discrete distribution on n points has max >= 1/n."""
    pi = np.asarray(pi, dtype=np.float64)
    return bool(pi.max() >= 1.0 / pi.shape[0] - 1e-12)


def theorem2_coefficient(pi: np.ndarray) -> float:
    """Theorem 2's ``a = 1 / (deg · π_max)`` for the uniform proposal
    over the same sample space (deg = n). Lies in (0, 1] and satisfies
    ``q(y|x) = 1/n >= a·π(y)``; the geometric rate is ρ = 1 − a."""
    pi = np.asarray(pi, dtype=np.float64)
    pi = pi / pi.sum()
    return float(1.0 / (pi.shape[0] * pi.max()))


# ----------------------------------------------------------------------
# Theorem 3 — high-weight vs. random initialization
# ----------------------------------------------------------------------
def kappa_high(pi: np.ndarray) -> float:
    """Eq. 15: κ for high-weight initialization (uniform over the t
    argmax elements)."""
    pi = np.asarray(pi, dtype=np.float64)
    pi = pi / pi.sum()
    pmax = pi.max()
    t = int(np.sum(np.isclose(pi, pmax)))
    return float(max(1.0 / (t * pmax) - 1.0, 1.0))


def kappa_random(pi: np.ndarray) -> float:
    """Eq. 16: κ for random (uniform) initialization."""
    pi = np.asarray(pi, dtype=np.float64)
    pi = pi / pi.sum()
    n = pi.shape[0]
    return float(max(1.0 - 1.0 / (n * pi.max()), 1.0 / (n * pi.min()) - 1.0))


def theorem3_condition(pi: np.ndarray) -> bool:
    """Eq. 12: True when high-weight initialization converges faster
    than random initialization for target ``pi``."""
    pi = np.asarray(pi, dtype=np.float64)
    pi = pi / pi.sum()
    n = pi.shape[0]
    pmax, pmin = pi.max(), pi.min()
    t = int(np.sum(np.isclose(pi, pmax)))
    c1 = (pmax < 1.0 / (2 * t)) and (pmax / max(pmin, 1e-300) > n / t)
    c2 = (pmax >= 1.0 / (2 * t)) and (pmin < 1.0 / (2 * n))
    return bool(c1 or c2)


def make_target_distribution(
    n: int, t: int, ratio: float, rng: np.random.Generator
) -> np.ndarray:
    """A Fig.-1-style target: ``t`` elements at π_max, the rest log-
    uniform in [π_max/ratio, π_max], one pinned at π_max/ratio."""
    lo = 1.0 / ratio
    rest = np.exp(rng.uniform(np.log(lo), 0.0, size=max(n - t - 1, 0)))
    pi = np.concatenate([np.ones(t), rest, [lo]])[:n]
    return pi / pi.sum()


def simulate_mh_chain(
    pi: np.ndarray,
    n_samples: int,
    rng: np.random.Generator,
    init: str = "random",
    burn_in: int = 0,
) -> np.ndarray:
    """Scalar M-H chain with uniform proposal over ``len(pi)`` states;
    returns the empirical distribution of the kept samples (the Fig. 1
    simulation protocol). ``init``: "random" | "weight"."""
    pi = np.asarray(pi, dtype=np.float64)
    pi = pi / pi.sum()
    n = pi.shape[0]
    if init == "weight":
        argmaxes = np.where(np.isclose(pi, pi.max()))[0]
        x = int(rng.choice(argmaxes))
    else:
        x = int(rng.integers(n))
    counts = np.zeros(n, dtype=np.int64)
    # Vectorize the chain by pre-drawing candidates/uniforms.
    cands = rng.integers(0, n, size=n_samples + burn_in)
    us = rng.random(n_samples + burn_in)
    for i in range(n_samples + burn_in):
        c = cands[i]
        if us[i] < pi[c] / pi[x]:
            x = c
        if i >= burn_in:
            counts[x] += 1
    return counts / counts.sum()


# ----------------------------------------------------------------------
# Exact transition distributions (ground truth for sampler tests)
# ----------------------------------------------------------------------
def exact_transition(
    g: CSRGraph,
    model: RandomWalkModel,
    cur: int,
    prev: int = -1,
    req_type: Optional[int] = None,
) -> np.ndarray:
    """The normalized transition distribution over the neighbor slots
    of ``cur`` for the given state — Eqs. 1-5 via the model's dynamic
    weight (Eq. 13)."""
    deg = int(g.degree(np.array([cur]))[0])
    prev_eidx = -1
    if prev >= 0:
        prev_eidx = int(g.edge_index(np.array([prev]), np.array([cur]))[0])
    wk = WalkerBatch(
        cur=np.full(deg, cur, dtype=np.int64),
        prev=np.full(deg, prev, dtype=np.int64),
        prev_eidx=np.full(deg, prev_eidx, dtype=np.int64),
        req_type=None
        if req_type is None
        else np.full(deg, req_type, dtype=np.int16),
    )
    eidx = g.indptr[cur] + np.arange(deg, dtype=np.int64)
    w = model.dyn_weight(g, wk, eidx)
    s = w.sum()
    return w / s if s > 0 else w
