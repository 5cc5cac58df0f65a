"""The paper's query set, reconstructed from the text.

Figure 7's images are not present in the paper text, so q1..q8 are
reconstructed to satisfy every textual constraint (see DESIGN.md §3):

* q2, q4, q5 contain a triangle on (u0, u1, u2) — Crystal can serve it
  straight from its clique index (Exp-3).
* q1, q3, q6, q7, q8 are triangle-free ("no cliques with more than two
  vertices in queries q1, q3, q6, q7 and q8").
* q5 is q4 plus an *end vertex* u5 ("sensitive to the end vertices,
  such as u5 in q5 ... processing time increased slightly from q4").
* Sizes reach 6 vertices ("communication cost was beyond control when
  the query vertices reach 6").

qc1..qc4 stand in for Figure 14's clique-heavy queries (Appendix C.4).
``FIG2_PATTERN`` is the 10-vertex running example of Figure 2(a), whose
edge set is fully determined by Examples 3 and 4.
"""
from repro.query.pattern import Pattern

# --- Figure 7 reconstruction ---

Q1 = Pattern(4, ((0, 1), (1, 2), (2, 3), (3, 0)), "q1-square")
Q2 = Pattern(4, ((0, 1), (1, 2), (0, 2), (2, 3)), "q2-tailed-triangle")
Q3 = Pattern(5, ((0, 1), (1, 2), (2, 3), (3, 4), (4, 0)), "q3-5cycle")
# house: triangle (0,1,2) + square (0,2,3,4) sharing edge (0,2)
Q4 = Pattern(5, ((0, 1), (1, 2), (0, 2), (2, 3), (3, 4), (4, 0)), "q4-house")
Q5 = Pattern(
    6, ((0, 1), (1, 2), (0, 2), (2, 3), (3, 4), (4, 0), (1, 5)), "q5-tailed-house"
)
Q6 = Pattern(6, ((0, 1), (1, 2), (2, 3), (3, 4), (4, 5), (5, 0)), "q6-6cycle")
Q7 = Pattern(
    6, ((0, 1), (1, 2), (2, 3), (3, 4), (4, 5), (5, 0), (0, 3)), "q7-theta"
)
Q8 = Pattern(
    6, ((0, 1), (1, 2), (3, 4), (4, 5), (0, 3), (1, 4), (2, 5)), "q8-grid2x3"
)

QUERIES: dict[str, Pattern] = {
    "q1": Q1, "q2": Q2, "q3": Q3, "q4": Q4,
    "q5": Q5, "q6": Q6, "q7": Q7, "q8": Q8,
}

# --- Figure 14 reconstruction (clique-heavy queries) ---

QC1 = Pattern(4, ((0, 1), (1, 2), (0, 2), (0, 3), (1, 3)), "qc1-diamond")
QC2 = Pattern(4, ((0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3)), "qc2-k4")
QC3 = Pattern(
    5, ((0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3), (3, 4)), "qc3-k4-tail"
)
QC4 = Pattern(
    5, ((0, 1), (1, 2), (0, 2), (2, 3), (3, 4), (4, 0), (0, 3)), "qc4-house-chord"
)

CLIQUE_QUERIES: dict[str, Pattern] = {"qc1": QC1, "qc2": QC2, "qc3": QC3, "qc4": QC4}

# --- Figure 2(a) running example (Examples 3 & 4) ---
# Tree edges of the MLST rooted at u0 (Example 4):
#   (0,1) (0,2) (0,7) (0,8) (0,9) (1,3) (1,4) (2,5) (2,6)
# Non-tree edges erased to form that MLST:
#   (1,2) (3,4) (4,5) (5,6) (8,9)
FIG2_PATTERN = Pattern(
    10,
    (
        (0, 1), (0, 2), (0, 7), (0, 8), (0, 9),
        (1, 3), (1, 4), (2, 5), (2, 6),
        (1, 2), (3, 4), (4, 5), (5, 6), (8, 9),
    ),
    "fig2-running-example",
)

ALL_QUERIES: dict[str, Pattern] = {**QUERIES, **CLIQUE_QUERIES}
