"""Baseline: Chehreghani's distance-proportional sampler ([13], §3.2).

Sources are drawn with ``P[s] = d(r,s) / Σ_u d(r,u)`` (one BFS from ``r``
gives all distances), and ``δ_s•(r)/P[s]`` is the unbiased importance
estimator of ``BC(r)``. This is the sampler whose *optimal* limit
(``P[s] ∝ δ_s•(r)``, Eq. 5) the paper's MH chain targets — the natural
head-to-head comparison in Table 5.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession

from ..bfs.local import bfs_sigma
from ..brandes.exact import dependency_matrix
from ..graphs.csr import CSRGraph
from .uniform_source import BaselineResult


def distance_distribution(g: CSRGraph, r: int) -> np.ndarray:
    """``P[s] ∝ d(r, s)`` over all vertices (0 at ``r`` itself)."""
    dist, _ = bfs_sigma(g, r)
    w = dist.astype(np.float64)
    w[w < 0] = 0.0  # unreachable — excluded (connected graphs: none)
    tot = w.sum()
    if tot == 0:
        raise ValueError("degenerate graph: all distances zero")
    return w / tot


def distance_sampler_estimate(
    spark: SparkSession,
    g: CSRGraph,
    r: int,
    T: int,
    *,
    seed: int = 0,
    scores: dict[int, float] | None = None,
) -> BaselineResult:
    """Estimate ``BC(r)`` from ``T`` distance-proportional samples."""
    rng = np.random.default_rng(seed)
    p = distance_distribution(g, r)
    samples = rng.choice(g.n, size=T, p=p)
    scores = dict(scores) if scores else {}
    missing = np.setdiff1d(np.unique(samples), np.array(sorted(scores), dtype=np.int64))
    if len(missing):
        dm = dependency_matrix(spark, g, [r], sources=missing)
        scores.update(dict(zip(dm["s"].astype(int), dm["delta"].astype(float))))
    vals = np.array([scores[int(s)] / p[int(s)] for s in samples])
    est = float(vals.mean())
    return BaselineResult(
        r=int(r),
        T=T,
        seed=seed,
        estimate_bc=est,
        estimate_nbc=est / (g.n * (g.n - 1)),
        n_scored=len(missing),
    )
