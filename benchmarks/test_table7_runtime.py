"""T7 — runtime: distributed sampling vs exact Brandes."""
from benchmarks._util import run_once, save, scale
from repro.evalharness.tables import table7


def test_table7_runtime(spark, benchmark):
    df = run_once(benchmark, lambda: table7(spark, scale()))
    save(df, "table7_runtime", "T7 — runtime scaling (fixed T vs exact Brandes)")

    assert (df["mh_secs"] > 0).all() and (df["exact_secs"] > 0).all()

    # Claim: at fixed T the sampler's cost is ~T·O(m) while exact Brandes
    # is n·O(m) — the speedup must grow with n once n ≫ T.
    big = df.sort_values("n")
    assert big["speedup"].iloc[-1] > big["speedup"].iloc[0], df
    # At the largest size (n = 4·T) the sampler must win outright.
    assert big["speedup"].iloc[-1] > 1.0, df
