"""DataFrame reverse sweep ≡ CSR dependency kernel."""
import numpy as np
import pytest

from repro.bfs.dataframe_dependency import dependency_scores
from repro.bfs.local import dependency_vector
from repro.graphs.spark_io import edges_spark, symmetric_edges

from .conftest import graph


@pytest.mark.parametrize(
    "key,src",
    [
        ("path7", 0),
        ("cycle9", 1),
        ("star8", 0),
        ("barbell5", 5),
        ("grid3x4", 0),
        ("roc3x4", 4),
        ("tree15", 0),
        ("er30", 3),
    ],
)
def test_matches_csr(spark, key, src):
    g = graph(key)
    sym = symmetric_edges(edges_spark(spark, g))
    dd = dependency_scores(spark, sym, src).toPandas().sort_values("id")
    ref = dependency_vector(g, src)
    ids = dd["id"].to_numpy()
    assert np.allclose(dd["delta"].to_numpy(), ref[ids])


def test_source_delta_zero(spark):
    g = graph("er30")
    sym = symmetric_edges(edges_spark(spark, g))
    row = dependency_scores(spark, sym, 7).where("id = 7").collect()
    assert row[0]["delta"] == 0.0


def test_star_center_dependencies(spark):
    # From a leaf, the centre's dependency is n−2 (all other leaves).
    g = graph("star8")
    sym = symmetric_edges(edges_spark(spark, g))
    row = dependency_scores(spark, sym, 1).where("id = 0").collect()
    assert row[0]["delta"] == g.n - 2


def test_sum_equals_brandes_total(spark):
    # Σ_v δ_s•(v) equals Σ_t (d(s,t) − 1) on a tree (unique paths).
    from repro.bfs.local import bfs_sigma

    g = graph("tree15")
    sym = symmetric_edges(edges_spark(spark, g))
    total = (
        dependency_scores(spark, sym, 0).groupBy().sum("delta").collect()[0][0]
    )
    dist, _ = bfs_sigma(g, 0)
    assert np.isclose(total, sum(int(d) - 1 for d in dist if d >= 1))
