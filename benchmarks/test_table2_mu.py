"""T2 — μ(r) across families (Theorem 2 shape claims)."""
from benchmarks._util import run_once, save, scale
from repro.evalharness.tables import table2


def test_table2_mu(spark, benchmark):
    df = run_once(benchmark, lambda: table2(spark, scale()))
    save(df, "table2_mu", "T2 — mu(r) across families and sizes (Theorem 2)")

    # Claim (Theorem 2): balanced separators keep μ(r) constant as n
    # grows — small in absolute terms AND flat within each family.
    seps = df[df["role"] == "separator"]
    assert (seps["mu"] < 1.5).all(), "separator mu should stay a small constant"
    for fam, sub in seps.groupby(seps["graph"].str.split("-").str[0]):
        if len(sub) >= 2:
            assert sub["mu"].max() <= sub["mu"].min() * 1.2, (fam, sub)

    mids = df[df["role"] == "middle"]
    assert (mids["mu"] < 1.2).all(), "path middle is a balanced separator"

    # Anti-example: the near-leaf vertex violates the balance condition
    # and μ grows with n (≈ n/2) — sample complexity is NOT constant.
    nl = df[df["role"] == "near-leaf"].sort_values("n")
    assert nl["mu"].is_monotonic_increasing
    # μ(near-leaf) ≈ n/2: growth must track the growth in n.
    mu_ratio = nl["mu"].iloc[-1] / nl["mu"].iloc[0]
    n_ratio = nl["n"].iloc[-1] / nl["n"].iloc[0]
    assert mu_ratio > 0.6 * n_ratio, (mu_ratio, n_ratio)
