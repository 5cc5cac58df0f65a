"""Graph generator tests: canonical form, determinism, expected shapes."""
import numpy as np
import pytest

from repro.graphs.generators import (
    adjacency_csr,
    barabasi_albert,
    degrees_of,
    grid_graph,
    watts_strogatz,
)
from repro.graphs.stats import profile


def _assert_canonical(e):
    assert e.dtype == np.int64
    assert (e[:, 0] < e[:, 1]).all()
    assert len(np.unique(e, axis=0)) == len(e)


# ---------------- grid ----------------

def test_grid_full_edge_count():
    e = grid_graph(4, 5)
    assert len(e) == 4 * 4 + 3 * 5  # rows*(cols-1) + (rows-1)*cols
    _assert_canonical(e)


def test_grid_drop_reduces_edges():
    full = grid_graph(10, 10)
    dropped = grid_graph(10, 10, drop_frac=0.2, seed=1)
    assert len(dropped) < len(full)


def test_grid_deterministic():
    a = grid_graph(8, 8, drop_frac=0.1, seed=3)
    b = grid_graph(8, 8, drop_frac=0.1, seed=3)
    assert np.array_equal(a, b)


def test_grid_is_sparse_high_diameter():
    e = grid_graph(14, 14, drop_frac=0.08, seed=7)
    prof = profile(e, 14 * 14, "grid")
    assert prof.avg_degree < 4
    assert prof.diameter_est >= 14  # road-like: diameter ~ side


# ---------------- watts-strogatz ----------------

def test_ws_avg_degree():
    e = watts_strogatz(200, 6, 0.1, seed=2)
    n = 200
    assert abs(2 * len(e) / n - 6) < 0.6  # rewiring may merge a few edges
    _assert_canonical(e)


def test_ws_rejects_odd_k():
    with pytest.raises(ValueError):
        watts_strogatz(10, 3, 0.1)


def test_ws_has_triangles():
    # ring lattice k=6 keeps high clustering: count triangles
    e = watts_strogatz(120, 6, 0.05, seed=4)
    adj = {}
    for a, b in e:
        adj.setdefault(a, set()).add(b)
        adj.setdefault(b, set()).add(a)
    tri = sum(len(adj[a] & adj[b]) for a, b in e)
    assert tri > 100


# ---------------- barabasi-albert ----------------

def test_ba_edge_count():
    e = barabasi_albert(100, 4, seed=5)
    # m seed-star edges + m per vertex added after the seed star
    assert len(e) == 4 + (100 - 4 - 1) * 4
    _assert_canonical(e)


def test_ba_power_law_hubs():
    e = barabasi_albert(400, 4, seed=6)
    d = degrees_of(e, 400)
    assert d.max() > 6 * np.median(d)  # heavy-tailed


def test_ba_rejects_bad_m():
    with pytest.raises(ValueError):
        barabasi_albert(5, 5)


def test_ba_deterministic():
    assert np.array_equal(barabasi_albert(80, 3, seed=9), barabasi_albert(80, 3, seed=9))


# ---------------- helpers ----------------

def test_degrees_of():
    e = np.array([[0, 1], [0, 2], [1, 2]])
    assert degrees_of(e, 4).tolist() == [2, 2, 2, 0]


def test_adjacency_csr_roundtrip():
    e = np.array([[0, 1], [1, 2], [0, 3]])
    indptr, idx = adjacency_csr(e, 4)
    assert sorted(idx[indptr[0]: indptr[1]]) == [1, 3]
    assert sorted(idx[indptr[1]: indptr[2]]) == [0, 2]
    assert sorted(idx[indptr[3]: indptr[4]]) == [0]
