"""Bench helpers: engine runner + result sink (results/*.json feeds
EXPERIMENTS.md)."""
import json
import os

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "results")

#: engine sweep order for the Figures 8-11 reproduction
ENGINE_ORDER = ("rads", "psgl", "twintwig", "seed", "crystal")
#: simulated per-machine memory for intermediates — engines whose
#: per-machine share (hash share for the shuffle baselines, per region
#: group for RADS) exceeds this are recorded failed (the paper's empty
#: bars / OOM crashes)
BUDGET_BYTES = int(128e6)


def run_one(gc, engine: str, qn: str, cindex) -> dict:
    """One engine × query run at bench scale; returns the metrics row."""
    from repro.query.queries import QUERIES
    from repro.tables import _run_engine

    met = _run_engine(gc, engine, QUERIES[qn], qn, BUDGET_BYTES, cindex)
    row = met.row()
    row["comm_breakdown"] = met.comm_breakdown
    return row


def dump_rows(name: str, rows: list[dict]) -> None:
    """Persist bench rows so EXPERIMENTS.md can quote them."""
    if not rows:
        return
    os.makedirs(RESULTS_DIR, exist_ok=True)
    with open(os.path.join(RESULTS_DIR, f"{name}.json"), "w") as f:
        json.dump(rows, f, indent=1)
