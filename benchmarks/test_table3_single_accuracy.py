"""T3 — single-space sampler accuracy (Theorem 1 shape claims)."""
from benchmarks._util import run_once, save, scale
from repro.evalharness.tables import table3


def test_table3_single_accuracy(spark, benchmark):
    df = run_once(benchmark, lambda: table3(spark, scale()))
    save(df, "table3_single_accuracy", "T3 — single-space sampler accuracy")

    # Claim: the estimate converges to E_π[f] — MAE vs the ergodic limit
    # shrinks as T grows, per (graph, r).
    for (_, _), sub in df.groupby(["graph", "r"]):
        sub = sub.sort_values("T")
        if len(sub) >= 2:
            assert (
                sub["mae_vs_limit"].iloc[-1] <= sub["mae_vs_limit"].iloc[0] + 1e-6
            ), sub

    # Claim: multiplicative bias vs nbc sits inside [1, μ(r)] (envelope),
    # up to sampling noise at the largest T.
    big = df[df["T"] == df["T"].max()]
    ok = (big["bias_factor"] >= 0.9) & (big["bias_factor"] <= big["mu"] * 1.1)
    assert ok.all(), big[~ok]

    # Claim: in the Theorem-2 regime (separators, μ≈1) the estimate is an
    # accurate estimate of nbc itself.
    seps = big[big["role"] == "separator"]
    assert (seps["mae_vs_nbc"] <= 0.05 + (seps["mu"] - 1) * seps["nbc_exact"]).all()
