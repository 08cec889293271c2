"""Baseline: uniform source sampling (Bader et al. [2] style).

Draw sources ``s ~ U(V \\ {r})`` i.i.d.; ``(n−1)·δ_s•(r)`` is an unbiased
estimator of ``BC(r)``. The per-sample work (one Brandes pass per
distinct source) fans out over Spark exactly like the MH scoring phase,
so time-per-sample comparisons against the MH sampler are apples-to-apples.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import SparkSession

from ..brandes.exact import dependency_matrix
from ..graphs.csr import CSRGraph


@dataclass(frozen=True)
class BaselineResult:
    """A baseline run: raw-scale and normalised estimates of BC(r)."""

    r: int
    T: int
    seed: int
    estimate_bc: float  # estimate of BC(r) (ordered-pair scale)
    estimate_nbc: float  # estimate of BC(r)/(n(n−1))
    n_scored: int


def uniform_source_estimate(
    spark: SparkSession,
    g: CSRGraph,
    r: int,
    T: int,
    *,
    seed: int = 0,
    scores: dict[int, float] | None = None,
) -> BaselineResult:
    """Estimate ``BC(r)`` from ``T`` uniform source samples."""
    rng = np.random.default_rng(seed)
    pool = np.setdiff1d(np.arange(g.n), [r])
    samples = pool[rng.integers(0, len(pool), size=T)]
    scores = dict(scores) if scores else {}
    missing = np.setdiff1d(np.unique(samples), np.array(sorted(scores), dtype=np.int64))
    if len(missing):
        dm = dependency_matrix(spark, g, [r], sources=missing)
        scores.update(dict(zip(dm["s"].astype(int), dm["delta"].astype(float))))
    vals = np.array([scores[int(s)] for s in samples])
    est = float((g.n - 1) * vals.mean())
    return BaselineResult(
        r=int(r),
        T=T,
        seed=seed,
        estimate_bc=est,
        estimate_nbc=est / (g.n * (g.n - 1)),
        n_scored=len(missing),
    )
