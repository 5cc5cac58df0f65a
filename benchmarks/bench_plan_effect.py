"""Appendix C.2 bench — RADS's plan vs RanS / RanM on DBLP-lite.

The paper reports plan choice mattering little on RoadNet (SM-E does
everything) and a lot on the denser graphs; DBLP-lite is the cheapest
dense dataset so the effect is visible within bench wall time.
"""
import pytest

from benchmarks._util import dump_rows
from repro.query.queries import QUERIES
from repro.tables import plan_effectiveness_rows

ROWS: list[dict] = []


@pytest.mark.parametrize("qn", ["q4", "q5", "q7", "q8"])
def test_plan_effectiveness_dblp(benchmark, gcb_dblp, qn):
    rows = benchmark.pedantic(
        plan_effectiveness_rows,
        args=(gcb_dblp, {qn: QUERIES[qn]}),
        kwargs={"n_random": 2},
        rounds=1,
        iterations=1,
    )
    ROWS.extend(rows)


def teardown_module():
    dump_rows("plan_effect_dblp", ROWS)
