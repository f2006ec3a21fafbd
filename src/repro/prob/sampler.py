"""Deterministic possible-world sampler (paper §6, Monte-Carlo estimation).

A possible world keeps edge e independently with probability p_e. Sampling is
deterministic in (seed, sample_id): each world uses a fresh
``default_rng([seed, sample_id])`` stream, so Spark fan-out over sample ids
reproduces the same worlds regardless of partitioning, and repeated runs are
identical (matching the paper's fixed-sample-count methodology).
"""
import math

import numpy as np


def hoeffding_samples(eps: float, delta: float) -> int:
    """Minimum sample count n ≥ ⌈ln(2/δ) / (2ε²)⌉ from Lemma 4."""
    return int(math.ceil(math.log(2.0 / delta) / (2.0 * eps * eps)))


def world_mask(p: np.ndarray, sample_id: int, seed: int = 0) -> np.ndarray:
    """Boolean keep-mask over edges for one sampled world."""
    rng = np.random.default_rng([seed, sample_id])
    return rng.random(p.size) < p


def sample_worlds(p: np.ndarray, n: int, seed: int = 0) -> np.ndarray:
    """(n × m) boolean matrix of n sampled worlds over m edges."""
    return np.stack([world_mask(p, s, seed) for s in range(n)]) if n else np.zeros((0, p.size), bool)
