"""Property-based tests over random small graphs (Hypothesis)."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.bfs.local import bfs_sigma, dependency_vector
from repro.brandes.reference import brandes_betweenness, brandes_dependency
from repro.brandes.relative import eq21_residual, min_ratio, mu_r
from repro.graphs.csr import from_edges, is_connected, largest_component
from repro.graphs.generators import erdos_renyi


def _random_connected(seed: int, n: int = 14, p: float = 0.25):
    return erdos_renyi(n, p, seed=seed)


graph_seeds = st.integers(min_value=0, max_value=10_000)


@given(graph_seeds)
@settings(max_examples=25, deadline=None)
def test_kernel_equals_reference(seed):
    g = _random_connected(seed)
    for s in range(g.n):
        assert np.allclose(dependency_vector(g, s), brandes_dependency(g, s))


@given(graph_seeds)
@settings(max_examples=25, deadline=None)
def test_bc_symmetry_of_distance(seed):
    g = _random_connected(seed)
    for s in range(min(g.n, 5)):
        dist_s, _ = bfs_sigma(g, s)
        for t in range(g.n):
            dist_t, _ = bfs_sigma(g, t)
            assert dist_s[t] == dist_t[s]


@given(graph_seeds)
@settings(max_examples=20, deadline=None)
def test_eq21_identity_random_graphs(seed):
    g = _random_connected(seed)
    bc = brandes_betweenness(g)
    pos = np.flatnonzero(bc > 0)
    if len(pos) < 2:
        return
    cols = {
        int(r): np.array([brandes_dependency(g, s)[r] for s in range(g.n)])
        for r in pos[:3]
    }
    keys = list(cols)
    for i in range(len(keys)):
        for j in range(i + 1, len(keys)):
            assert abs(eq21_residual(cols[keys[i]], cols[keys[j]])) < 1e-9


@given(graph_seeds)
@settings(max_examples=20, deadline=None)
def test_mu_at_least_one_random(seed):
    g = _random_connected(seed)
    bc = brandes_betweenness(g)
    for r in np.flatnonzero(bc > 0)[:3]:
        col = np.array([brandes_dependency(g, s)[r] for s in range(g.n)])
        assert mu_r(col) >= 1.0


@given(
    st.lists(
        st.tuples(st.integers(0, 9), st.integers(0, 9)).filter(lambda e: e[0] != e[1]),
        min_size=1,
        max_size=30,
    )
)
@settings(max_examples=40, deadline=None)
def test_csr_roundtrip_random_edgelists(pairs):
    import pandas as pd

    canon = {(min(a, b), max(a, b)) for a, b in pairs}
    df = pd.DataFrame(sorted(canon), columns=["src", "dst"])
    g = from_edges(10, df)
    assert g.m == len(canon)
    back = g.edge_pandas()
    assert set(zip(back["src"], back["dst"])) == canon
    lc = largest_component(g)
    assert is_connected(lc)


@given(st.integers(0, 5000))
@settings(max_examples=30, deadline=None)
def test_min_ratio_bounds_random(seed):
    rng = np.random.default_rng(seed)
    a = rng.random(20) * rng.integers(0, 2, 20)
    b = rng.random(20) * rng.integers(0, 2, 20)
    out = min_ratio(a, b)
    assert ((out >= 0) & (out <= 1)).all()
