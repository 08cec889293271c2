"""T5 — MH vs uniform-source [2], distance [13], RK [30] baselines."""
from benchmarks._util import run_once, save, scale
from repro.evalharness.tables import table5


def test_table5_baselines(spark, benchmark):
    df = run_once(benchmark, lambda: table5(spark, scale()))
    save(df, "table5_baselines", "T5 — baseline comparison (equal sample budget)")

    assert df["method"].nunique() == 4

    # Claim: on separator vertices (the paper's regime) the MH sampler is
    # competitive with the best baseline — within 2× of the smallest
    # mean relative error on a majority of separator probes.
    seps = df[df["role"] == "separator"]
    wins = 0
    probes = 0
    for (_, _), sub in seps.groupby(["graph", "r"]):
        best = sub["mean_rel_err"].min()
        mh = sub[sub["method"] == "mh (this paper)"]["mean_rel_err"].iloc[0]
        probes += 1
        if mh <= max(2 * best, best + 0.02):
            wins += 1
    assert probes > 0 and wins >= probes * 0.6, (wins, probes)
