"""Exact Poisson-binomial support machinery (paper §5.1, Eq. 6–7).

For a triangle △ with surviving 4-clique extension probabilities
q_1..q_c (q_i = Pr(E_i), mutually independent because the extension edge
sets are disjoint), the support count ζ = Σ Bernoulli(q_i) is
Poisson-binomial. The dynamic program below is the textbook O(c²)
convolution of Eq. 7; the nucleus score is

    κ(△) = max { k : Pr(△) · Pr[ζ ≥ k] ≥ θ },   κ = −1 if even k=0 fails.

All kernels are vectorized numpy and shared by the Spark pandas-UDF scorer
and the driver peeler.
"""
import numpy as np

#: absolute tolerance when comparing probabilities against θ — protects the
#: ≥ comparisons from float round-off in long convolutions.
EPS = 1e-12


def pb_pmf(qs: np.ndarray) -> np.ndarray:
    """Poisson-binomial pmf of ζ = Σ Bern(q_i); length len(qs)+1."""
    qs = np.asarray(qs, dtype=np.float64)
    dp = np.zeros(qs.size + 1)
    dp[0] = 1.0
    for j, q in enumerate(qs):
        # dp[:j+2] holds the pmf over the first j cliques (Eq. 7)
        dp[1 : j + 2] = dp[1 : j + 2] * (1.0 - q) + dp[: j + 1] * q
        dp[0] *= 1.0 - q
    return dp


def tail_from_pmf(pmf: np.ndarray) -> np.ndarray:
    """tail[k] = Pr[ζ ≥ k] for k = 0..len(pmf)-1 (tail[0] forced to 1)."""
    tail = np.cumsum(pmf[::-1])[::-1]
    tail[0] = 1.0
    return np.clip(tail, 0.0, 1.0)


def pb_tail(qs: np.ndarray) -> np.ndarray:
    """Exact DP tail Pr[ζ ≥ k], k = 0..c."""
    return tail_from_pmf(pb_pmf(qs))


def kappa_from_tail(p_tri: float, tail: np.ndarray, theta: float) -> int:
    """max k with Pr(△)·Pr[ζ ≥ k] ≥ θ; −1 when the triangle itself fails θ."""
    ok = p_tri * tail >= theta - EPS
    if not ok[0]:
        return -1
    # tail is non-increasing, so ok is a prefix — take its length − 1.
    bad = np.flatnonzero(~ok)
    return int(bad[0] - 1) if bad.size else int(tail.size - 1)


def kappa_dp(p_tri: float, qs: np.ndarray, theta: float) -> int:
    """Exact κ score via the dynamic program."""
    return kappa_from_tail(p_tri, pb_tail(qs), theta)
