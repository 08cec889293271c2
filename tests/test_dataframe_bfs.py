"""DataFrame BFS ≡ CSR BFS on the graph suite."""
import numpy as np
import pytest

from repro.bfs.dataframe_bfs import bfs_levels_sigma
from repro.bfs.local import bfs_sigma
from repro.graphs.spark_io import edges_spark, symmetric_edges

from .conftest import graph


def _compare(spark, key, src):
    g = graph(key)
    sym = symmetric_edges(edges_spark(spark, g))
    lv = bfs_levels_sigma(spark, sym, src).toPandas().sort_values("id")
    dist, sigma = bfs_sigma(g, src)
    # Every reachable vertex present, nothing extra.
    assert set(lv["id"]) == set(np.flatnonzero(dist >= 0))
    ids = lv["id"].to_numpy()
    assert np.array_equal(lv["dist"].to_numpy(), dist[ids])
    assert np.allclose(lv["sigma"].to_numpy(), sigma[ids])


@pytest.mark.parametrize(
    "key,src",
    [
        ("path7", 0),
        ("path7", 3),
        ("cycle9", 4),
        ("star8", 0),
        ("star8", 3),
        ("complete6", 2),
        ("barbell5", 5),
        ("grid3x4", 11),
        ("roc3x4", 0),
        ("tree15", 7),
        ("er30", 12),
        ("ba30", 0),
    ],
)
def test_matches_csr(spark, key, src):
    _compare(spark, key, src)


def test_source_row(spark):
    g = graph("grid3x4")
    sym = symmetric_edges(edges_spark(spark, g))
    lv = bfs_levels_sigma(spark, sym, 5).where("id = 5").collect()
    assert lv[0]["dist"] == 0 and lv[0]["sigma"] == 1.0


def test_row_count_equals_reachable(spark):
    g = graph("twocomm10")
    sym = symmetric_edges(edges_spark(spark, g))
    assert bfs_levels_sigma(spark, sym, 0).count() == g.n  # connected
