"""The spark-submit job entrypoints build their tables at test scale."""
import importlib.util
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"


def _load(name: str):
    # jobs/ is not a package; load by path (as spark-submit would).
    if str(JOBS) not in sys.path:
        sys.path.insert(0, str(JOBS))
    spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


@pytest.mark.parametrize(
    "job,min_rows",
    [
        ("table1_datasets", 8),
        ("table2_mu", 10),
        ("table4_epsdelta", 2),
        ("table7_runtime", 2),
    ],
)
def test_job_builds_table(spark, job, min_rows):
    mod = _load(job)
    df = mod.build(spark, "test")
    assert len(df) >= min_rows


def test_table3_job(spark):
    df = _load("table3_single").build(spark, "test")
    assert {"mu", "T", "mean_est", "mae_vs_nbc"} <= set(df.columns)
    assert len(df) > 10


def test_table5_job(spark):
    df = _load("table5_baselines").build(spark, "test")
    assert df["method"].nunique() == 4


def test_table6_job(spark):
    df = _load("table6_joint").build(spark, "test")
    assert {"exact_ratio", "est_ratio", "exact_rel_star"} <= set(df.columns)
    assert len(df) > 0
