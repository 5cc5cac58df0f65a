"""The paper's published numbers, verbatim, for side-by-side comparison
in EXPERIMENTS.md. Values are copied from the paper text; oddities are
preserved as printed (e.g. RoadNet's avg degree of 1.05 in Table 1 is
inconsistent with its |V|/|E| but is what the paper shows; Table 4's
"0.08M" for q1/ET is presumably 0.08 GB)."""

# Table 1: Profiles of datasets — |V|, |E|, avg degree, diameter
TABLE1 = {
    "RoadNet": {"|V|": "56M", "|E|": "717M", "avg_degree": 1.05, "diameter": "48K"},
    "DBLP": {"|V|": "0.3M", "|E|": "1.0M", "avg_degree": 6.62, "diameter": 21},
    "LiveJournal": {"|V|": "4.8M", "|E|": "42.9M", "avg_degree": 18, "diameter": 17},
    "UK2002": {"|V|": "18.5M", "|E|": "298.1M", "avg_degree": 32, "diameter": 22},
}

# Table 2: Crystal's index size vs data graph file size
TABLE2 = {
    "DBLP": {"graph": "13M", "index": "210M", "ratio": 16.2},
    "RoadNet": {"graph": "2.3G", "index": "16.9G", "ratio": 7.3},
    "LiveJournal": {"graph": "501M", "index": "6.5G", "ratio": 13.0},
    "UK2002": {"graph": "4.1G", "index": "60G", "ratio": 14.6},
}

# Table 3: EL vs ET intermediate-result size on RoadNet (MB); '-' =
# negligible, not reported in the paper
TABLE3_ROADNET_MB = {
    "q1": {"EL": 264, "ET": 163},
    "q2": {"EL": 13, "ET": 5},
    "q3": {"EL": 65, "ET": 33},
    "q4": {"EL": 81, "ET": 40},
    "q5": {"EL": 136, "ET": 63},
    "q6": {"EL": 183, "ET": 73},
    "q7": {"EL": None, "ET": None},
    "q8": {"EL": None, "ET": None},
}

# Table 4: EL vs ET on DBLP (GB)
TABLE4_DBLP_GB = {
    "q1": {"EL": 0.3, "ET": 0.08},
    "q2": {"EL": 0.2, "ET": 0.06},
    "q3": {"EL": 4.5, "ET": 1.1},
    "q4": {"EL": 3.2, "ET": 0.7},
    "q5": {"EL": 17.6, "ET": 3.8},
    "q6": {"EL": 7.6, "ET": 1.3},
    "q7": {"EL": 5.3, "ET": 0.9},
    "q8": {"EL": 4.0, "ET": 0.8},
}

# Qualitative shapes of Figures 8-11 that the perf reproduction must hold
FIGURE_SHAPES = [
    "RoadNet: RADS & PSgL >= 1 order of magnitude faster than join engines;"
    " RADS communication ~0 (SM-E covers nearly everything)",
    "DBLP: PSgL communication far above others; RADS < 5MB; RADS beats Crystal"
    " even on triangle queries",
    "LiveJournal: TwinTwig/SEED/PSgL impractical for q3..q8; Crystal wins"
    " q2/q4/q5 (triangle from index); RADS wins triangle-free q6/q7/q8",
    "UK2002: TwinTwig/SEED/PSgL fail (OOM) beyond q3; RADS communication"
    " >= 2 orders of magnitude below others; Crystal faster on clique queries",
]
