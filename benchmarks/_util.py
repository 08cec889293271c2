"""Shared helpers for the table benchmarks.

Every benchmark builds its table exactly once (``pedantic`` with one
round — the tables are themselves repeated-measurement experiments),
asserts the paper's shape claims on the resulting frame, and writes the
rendered table to ``results/tableN_*.txt`` so EXPERIMENTS.md quotes
measured output verbatim.
"""
from __future__ import annotations

import os
from pathlib import Path

import pandas as pd

RESULTS = Path(__file__).resolve().parent.parent / "results"


def scale() -> str:
    """Bench scale, overridable for quick iteration (REPRO_BENCH_SCALE=test)."""
    return os.environ.get("REPRO_BENCH_SCALE", "bench")


def save(df: pd.DataFrame, name: str, title: str) -> pd.DataFrame:
    """Persist the rendered table and return ``df`` unchanged."""
    from repro.evalharness.tables import render

    RESULTS.mkdir(exist_ok=True)
    (RESULTS / f"{name}.txt").write_text(render(df, title))
    return df


def run_once(benchmark, fn):
    """Run ``fn`` exactly once under pytest-benchmark timing."""
    return benchmark.pedantic(fn, rounds=1, iterations=1)
