"""BLB estimation with accuracy guarantee (§V-B).

The attribute distance δ* of a candidate community is a mean-like
estimator, so by the CLT its sampling distribution is ≈ normal and the
margin of error of a 1−α confidence interval is ``ε = z_{α/2}·σ_δ*``.
σ_δ* is estimated by the Bag of Little Bootstraps [Kleiner et al. 2014]:
``s`` subsamples of size ``b = n^m`` (m ∈ [0.5,1)), each bootstrapped with
``r`` size-n resamples; each subsample yields ε_i = z·σ_i and the final
MoE is their mean. (Eq. 11's σ is the sample *standard deviation* of the
resample estimates — the paper's formula omits the square/root.)

Theorem 11 turns a user error bound ``e`` into the MoE acceptance test
``ε ≤ δ*·e/(1+e)``; Eq. 12 sizes the incremental sample when it fails.
"""
from __future__ import annotations

from dataclasses import dataclass
from statistics import NormalDist
from typing import Optional, Sequence

import numpy as np


@dataclass(frozen=True)
class BLBParams:
    """Knobs of the BLB margin-of-error estimator."""

    m: float = 0.7  # subsample scale factor, b = ceil(n^m), m ∈ [0.5, 1)
    r: int = 50  # bootstrap resamples per subsample
    s: int = 3  # desired number of subsamples (clamped so s·b ≤ n)


@dataclass(frozen=True)
class BLBEstimate:
    """Outcome of one BLB run."""

    delta_star: float  # point estimate: mean of the values
    moe: float  # ε = mean over subsamples of z_{α/2}·σ_i
    n_blb: int  # |S_blb| = total nodes drawn into subsamples
    n_subsamples: int


def z_value(alpha: float) -> float:
    """Normal critical value with right-tail probability α/2."""
    return NormalDist().inv_cdf(1 - alpha / 2)


def blb_estimate(
    values: Sequence[float],
    alpha: float = 0.05,
    params: BLBParams = BLBParams(),
    seed: int = 0,
) -> BLBEstimate:
    """BLB margin of error for the mean of ``values``.

    ``values`` are the composite distances f(·,q) of a candidate
    community's members (q excluded). Degenerate inputs (n ≤ 1 or zero
    spread) get MoE 0 — the estimate is exact.
    """
    vals = np.asarray(values, dtype=float)
    n = len(vals)
    if n == 0:
        return BLBEstimate(0.0, 0.0, 0, 0)
    point = float(vals.mean())
    if n == 1 or float(vals.std()) == 0.0:
        return BLBEstimate(point, 0.0, n, 1)
    rng = np.random.default_rng(seed)
    b = max(2, int(np.ceil(n ** params.m)))
    s = max(1, min(params.s, n // b))
    z = z_value(alpha)
    order = rng.permutation(n)
    moes = []
    for i in range(s):
        sub = vals[order[i * b : (i + 1) * b]]
        # bootstrap the *size-n* estimator from the b-sized subsample:
        # multinomial resample counts avoid materialising n draws
        counts = rng.multinomial(n, np.full(len(sub), 1.0 / len(sub)), size=params.r)
        est = counts @ sub / n
        sigma = float(est.std(ddof=1))
        moes.append(z * sigma)
    return BLBEstimate(point, float(np.mean(moes)), s * b, s)


def moe_threshold(delta_star: float, e: float) -> float:
    """Theorem 11: the MoE bound ``δ*·e/(1+e)`` that guarantees
    ``|δ*−δ|/δ ≤ e`` at confidence 1−α."""
    return delta_star * e / (1.0 + e)


def accuracy_guaranteed(estimate: BLBEstimate, e: float) -> bool:
    """Does the estimate satisfy the Theorem-11 acceptance test?"""
    return estimate.moe <= moe_threshold(estimate.delta_star, e)


def incremental_sample_size(
    estimate: BLBEstimate, e: float, m: float = 0.7
) -> int:
    """Eq. 12: ``|ΔS| = |S_blb|·[(ε/(δ*e/(1+e)))^{2m} − 1]``.

    Zero when the guarantee already holds; always ≥ 1 otherwise so a
    failing round makes progress even when ε barely misses the bound.
    """
    thr = moe_threshold(estimate.delta_star, e)
    if thr <= 0 or estimate.moe <= thr:
        return 0
    grow = (estimate.moe / thr) ** (2 * m) - 1.0
    return max(1, int(np.ceil(estimate.n_blb * grow)))
