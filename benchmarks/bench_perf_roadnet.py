"""Exp-1 (Figure 8) bench — five engines × q1..q8 on RoadNet-lite.

Expected shape: RADS (and PSgL) far faster than the join engines; RADS
communication ≈ 0 because SM-E covers almost every candidate on a
locality-partitioned road graph.
"""
import pytest

from benchmarks._util import ENGINE_ORDER, dump_rows, run_one
from repro.query.queries import QUERIES

ROWS: list[dict] = []


@pytest.mark.parametrize("engine", ENGINE_ORDER)
@pytest.mark.parametrize("qn", sorted(QUERIES))
def test_perf_roadnet(benchmark, gcb_road, cindexb_road, qn, engine):
    row = benchmark.pedantic(
        run_one, args=(gcb_road, engine, qn, cindexb_road), rounds=1, iterations=1
    )
    ROWS.append(row)


def teardown_module():
    dump_rows("perf_roadnet", ROWS)
