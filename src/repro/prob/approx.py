"""AP — statistical approximations of the Poisson-binomial tail (paper §5.3).

Four O(c) approximations of Pr[ζ ≥ k] — Poisson (Le Cam), Translated
Poisson (Röllin), Lyapunov-CLT Normal, and Binomial (Ehm) — plus the paper's
hyperparameter selector with exact-DP fallback:

    (1) c ≥ A                         → CLT
    (2) c < B and max q_i < C         → Poisson(λ = μ)
    (3) Σ q_i² > 1                    → Translated Poisson
    (4) σ²/(c·p̄(1−p̄)) ≥ D, p̄ = μ/c → Binomial(n=c, p=p̄)
    (5) otherwise                     → exact DP

with the paper's values A=200, B=100, C=0.25, D=0.9.
"""
import math

import numpy as np

from repro.prob.support import kappa_from_tail, pb_tail

A, B, C, D = 200, 100, 0.25, 0.9

_erf = np.vectorize(math.erf, otypes=[np.float64])
_lgamma = np.vectorize(math.lgamma, otypes=[np.float64])


def poisson_tail(lam: float, c: int) -> np.ndarray:
    """tail[k] = Pr[Poisson(λ) ≥ k], k = 0..c (Eq. 8/10 recursion)."""
    if lam <= 0:
        t = np.zeros(c + 1)
        t[0] = 1.0
        return t
    ks = np.arange(1, c + 1)
    pmf = np.concatenate(([math.exp(-lam)], math.exp(-lam) * np.cumprod(lam / ks)))
    cdf_below = np.concatenate(([0.0], np.cumsum(pmf[:-1])))  # Pr[ζ < k]
    return np.clip(1.0 - cdf_below, 0.0, 1.0)


def translated_poisson_tail(mu: float, var: float, c: int) -> np.ndarray:
    """Translated Poisson Y = ⌊λ₂⌋ + Pois(μ − ⌊λ₂⌋), λ₂ = μ − σ² (Eq. 11–12).

    For a Poisson-binomial, σ² = Σq(1−q) ≤ Σq = μ, so the shift ⌊λ₂⌋ is
    always ≥ 0; shift = 0 degenerates to the plain Poisson approximation.
    """
    shift = max(0, math.floor(mu - var))
    base = poisson_tail(mu - shift, max(0, c - shift))
    tail = np.ones(c + 1)
    if c >= shift:
        tail[shift:] = base[: c + 1 - shift]
    tail[0] = 1.0
    return tail


def clt_tail(mu: float, sigma: float, c: int) -> np.ndarray:
    """Normal survival 1 − Φ((k−μ)/σ) per Lyapunov CLT (Eq. 13)."""
    ks = np.arange(c + 1, dtype=np.float64)
    if sigma <= 0:
        tail = (ks <= mu + 1e-12).astype(np.float64)
    else:
        z = (ks - mu) / sigma
        tail = 0.5 * (1.0 - _erf(z / math.sqrt(2.0)))
    tail[0] = 1.0
    return np.clip(tail, 0.0, 1.0)


def binomial_tail(n: int, p: float) -> np.ndarray:
    """tail[k] = Pr[Binomial(n, p) ≥ k], k = 0..n (log-space pmf, Eq. 14)."""
    if p <= 0:
        t = np.zeros(n + 1)
        t[0] = 1.0
        return t
    if p >= 1:
        return np.ones(n + 1)
    ks = np.arange(n + 1, dtype=np.float64)
    logpmf = (
        _lgamma(n + 1.0)
        - _lgamma(ks + 1.0)
        - _lgamma(n - ks + 1.0)
        + ks * math.log(p)
        + (n - ks) * math.log1p(-p)
    )
    pmf = np.exp(logpmf)
    tail = np.cumsum(pmf[::-1])[::-1]
    tail[0] = 1.0
    return np.clip(tail, 0.0, 1.0)


def choose_method(qs: np.ndarray) -> str:
    """The paper's §5.3 condition cascade; returns the method name."""
    c = qs.size
    if c == 0:
        return "dp"
    mu = float(qs.sum())
    if c >= A:
        return "clt"
    if c < B and float(qs.max()) < C:
        return "poisson"
    if float((qs**2).sum()) > 1.0:
        return "tpoisson"
    pbar = mu / c
    binom_var = c * pbar * (1.0 - pbar)
    var = float((qs * (1.0 - qs)).sum())
    if binom_var > 0 and var / binom_var >= D:
        return "binomial"
    return "dp"


def ap_tail(qs: np.ndarray) -> tuple[np.ndarray, str]:
    """Approximate tail Pr[ζ ≥ k] (k=0..c) and the method used."""
    qs = np.asarray(qs, dtype=np.float64)
    c = qs.size
    method = choose_method(qs)
    mu = float(qs.sum())
    var = float((qs * (1.0 - qs)).sum())
    if method == "clt":
        return clt_tail(mu, math.sqrt(var), c), method
    if method == "poisson":
        return poisson_tail(mu, c), method
    if method == "tpoisson":
        return translated_poisson_tail(mu, var, c), method
    if method == "binomial":
        return binomial_tail(c, mu / c), method
    return pb_tail(qs), "dp"


def kappa_ap(p_tri: float, qs: np.ndarray, theta: float) -> tuple[int, str]:
    """AP κ score and the approximation that produced it."""
    tail, method = ap_tail(np.asarray(qs, dtype=np.float64))
    return kappa_from_tail(p_tri, tail, theta), method
