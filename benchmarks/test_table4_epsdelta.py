"""T4 — (ε, δ) guarantee: Eq.-14 budgets achieve the promised coverage."""
from benchmarks._util import run_once, save, scale
from repro.evalharness.tables import table4


def test_table4_epsdelta(spark, benchmark):
    df = run_once(benchmark, lambda: table4(spark, scale()))
    save(df, "table4_epsdelta", "T4 — (eps, delta) guarantee coverage")

    # Claim (Theorem 1): with T from Eq. 14, failure probability ≤ δ
    # against the chain's true target.
    assert (df["fail_rate_vs_limit"] <= df["delta"]).all(), df

    # Claim (paper's reading): for μ ≈ 1 vertices the same holds against
    # nbc(r) — the two targets coincide in the Theorem-2 regime.
    low_mu = df[df["mu"] < 1.1]
    assert (low_mu["fail_rate_vs_nbc"] <= low_mu["delta"]).all(), low_mu

    # The Eq.-14 budget is constant-ish (does not scale with n).
    assert (df["eq14_T"] < 20_000).all()
