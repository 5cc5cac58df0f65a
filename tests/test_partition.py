"""Partitioner tests: coverage, balance, and the locality property that
justifies the METIS substitution (bfs_partition cuts far fewer edges)."""
import numpy as np
import pytest

from repro.graphs.generators import grid_graph, watts_strogatz
from repro.graphs.partition import bfs_partition, edge_cut, hash_partition


def test_hash_partition_covers_all():
    o = hash_partition(100, 4)
    assert len(o) == 100
    assert set(np.unique(o)) <= {0, 1, 2, 3}


def test_hash_partition_roughly_balanced():
    o = hash_partition(10_000, 8)
    sizes = np.bincount(o, minlength=8)
    assert sizes.min() > 900 and sizes.max() < 1600


def test_bfs_partition_covers_all():
    e = grid_graph(12, 12, seed=1)
    o = bfs_partition(e, 144, 4, seed=1)
    assert (o >= 0).all() and (o < 4).all()


def test_bfs_partition_balanced():
    e = grid_graph(16, 16, seed=2)
    o = bfs_partition(e, 256, 4, seed=2)
    sizes = np.bincount(o, minlength=4)
    assert sizes.min() >= 0.5 * 256 / 4
    assert sizes.max() <= 2.0 * 256 / 4


def test_bfs_partition_beats_hash_on_locality():
    e = grid_graph(20, 20, seed=3)
    n = 400
    cut_bfs = edge_cut(e, bfs_partition(e, n, 4, seed=3))
    cut_hash = edge_cut(e, hash_partition(n, 4))
    assert cut_bfs < cut_hash / 3  # region growing is far more local


def test_bfs_partition_on_small_world():
    e = watts_strogatz(300, 6, 0.1, seed=4)
    o = bfs_partition(e, 300, 3, seed=4)
    assert len(set(o.tolist())) == 3


def test_bfs_partition_handles_disconnected():
    e = np.array([[0, 1], [2, 3]])  # two components
    o = bfs_partition(e, 4, 2, seed=0)
    assert (o >= 0).all()


def test_single_machine_partition():
    e = grid_graph(5, 5)
    o = bfs_partition(e, 25, 1, seed=0)
    assert (o == 0).all()
    assert edge_cut(e, o) == 0


def test_bad_m_raises():
    with pytest.raises(ValueError):
        bfs_partition(np.array([[0, 1]]), 2, 0)


def test_edge_cut_counts():
    e = np.array([[0, 1], [1, 2], [2, 3]])
    owner = np.array([0, 0, 1, 1])
    assert edge_cut(e, owner) == 1
