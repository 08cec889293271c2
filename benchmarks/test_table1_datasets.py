"""T1 — dataset summary benchmark (regenerates EXPERIMENTS.md table 1)."""
from benchmarks._util import run_once, save, scale
from repro.evalharness.tables import table1


def test_table1_datasets(spark, benchmark):
    df = run_once(benchmark, lambda: table1(spark, scale()))
    save(df, "table1_datasets", "T1 — dataset summary")
    assert len(df) == 8
    assert (df["n"] > 0).all() and (df["m"] > 0).all()
    # Exact Brandes is the expensive thing the paper's samplers avoid.
    assert (df["exact_bc_secs"] > 0).all()
