"""GraphProfile (Table 1 machinery) tests on graphs with known shapes."""
import numpy as np

from repro.graphs.generators import grid_graph
from repro.graphs.stats import profile


def test_profile_path():
    e = np.array([[i, i + 1] for i in range(9)])
    p = profile(e, 10, "path10")
    assert p.n_vertices == 10 and p.n_edges == 9
    assert p.avg_degree == 1.8
    assert p.diameter_est == 9  # double sweep is exact on trees


def test_profile_cycle():
    e = np.array([[i, (i + 1) % 8] for i in range(8)])
    e = np.stack([e.min(axis=1), e.max(axis=1)], axis=1)
    p = profile(e, 8)
    assert p.diameter_est == 4


def test_profile_full_grid():
    e = grid_graph(6, 6)
    p = profile(e, 36)
    assert p.diameter_est == 10  # manhattan corner-to-corner


def test_profile_row_keys():
    e = np.array([[0, 1]])
    r = profile(e, 2, "e").row()
    assert set(r) == {"dataset", "|V|", "|E|", "avg_degree", "diameter"}
