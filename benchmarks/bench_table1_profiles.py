"""Table 1 bench — profile generation for each lite dataset."""
import pytest

from benchmarks._util import dump_rows
from repro.graphs.datasets import DATASETS, make_edges
from repro.graphs.stats import profile

ROWS: list[dict] = []


@pytest.mark.parametrize("name", sorted(DATASETS))
def test_table1_profile(benchmark, name):
    def run():
        edges, n = make_edges(name, "lite")
        return profile(edges, n, name=f"{name}_lite")

    prof = benchmark.pedantic(run, rounds=1, iterations=1)
    assert prof.n_edges > 0
    ROWS.append(prof.row())


def teardown_module():
    dump_rows("table1_profiles", ROWS)
