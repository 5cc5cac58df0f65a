"""Exp-3 (Figure 10) bench — LiveJournal-lite (dense, skewed).

Query subset: the dense-graph queries the paper highlights (q3/q7/q8
omitted to bound wall time; the paper's join baselines already became
impractical from q3 on). Expected shape: join engines blow their memory
budget or crawl; Crystal wins the triangle queries; RADS wins q6.
"""
import pytest

from benchmarks._util import ENGINE_ORDER, dump_rows, run_one

ROWS: list[dict] = []
QS = ["q1", "q2", "q4", "q5", "q6"]


@pytest.mark.parametrize("engine", ENGINE_ORDER)
@pytest.mark.parametrize("qn", QS)
def test_perf_livejournal(benchmark, gcb_lj, cindexb_lj, qn, engine):
    row = benchmark.pedantic(
        run_one, args=(gcb_lj, engine, qn, cindexb_lj), rounds=1, iterations=1
    )
    ROWS.append(row)


def teardown_module():
    dump_rows("perf_livejournal", ROWS)
