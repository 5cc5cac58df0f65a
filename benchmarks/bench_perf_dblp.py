"""Exp-2 (Figure 9) bench — five engines × q1..q8 on DBLP-lite.

Expected shape: PSgL's communication dwarfs the others; RADS stays tiny
thanks to fetch caching; RADS competitive with Crystal even on the
triangle queries q2/q4/q5.
"""
import pytest

from benchmarks._util import ENGINE_ORDER, dump_rows, run_one
from repro.query.queries import QUERIES

ROWS: list[dict] = []


@pytest.mark.parametrize("engine", ENGINE_ORDER)
@pytest.mark.parametrize("qn", sorted(QUERIES))
def test_perf_dblp(benchmark, gcb_dblp, cindexb_dblp, qn, engine):
    row = benchmark.pedantic(
        run_one, args=(gcb_dblp, engine, qn, cindexb_dblp), rounds=1, iterations=1
    )
    ROWS.append(row)


def teardown_module():
    dump_rows("perf_dblp", ROWS)
