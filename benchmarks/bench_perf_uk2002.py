"""Exp-4 (Figure 11) bench — UK2002-lite (largest, densest).

Expected shape: TwinTwig/SEED/PSgL exceed the memory budget on the
larger queries (the paper's OOM failures); RADS communication orders of
magnitude below the rest; Crystal fastest on the clique queries.
"""
import pytest

from benchmarks._util import ENGINE_ORDER, dump_rows, run_one

ROWS: list[dict] = []
QS = ["q1", "q2", "q4", "q6"]


@pytest.mark.parametrize("engine", ENGINE_ORDER)
@pytest.mark.parametrize("qn", QS)
def test_perf_uk2002(benchmark, gcb_uk, cindexb_uk, qn, engine):
    row = benchmark.pedantic(
        run_one, args=(gcb_uk, engine, qn, cindexb_uk), rounds=1, iterations=1
    )
    ROWS.append(row)


def teardown_module():
    dump_rows("perf_uk2002", ROWS)
