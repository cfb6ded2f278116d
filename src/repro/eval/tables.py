"""Rendering of reproduction tables with the paper's numbers alongside.

Each ``render_tableN`` takes the harness output and produces a text
block that places the measured values next to the values published in
the paper (Tables 1-6 of Eltabakh et al., VLDB 2023), so a reader can
diff shapes directly. The same text goes to job stdout and is the
source for EXPERIMENTS.md.
"""
from __future__ import annotations

import pandas as pd

# ---- paper-published values ------------------------------------------------

PAPER_TABLE3 = {          # benchmark -> (Aurum, D3L, CMDL), P=R
    "2A": (0.22, 0.22, 0.30),
    "2B": (0.21, 0.37, 0.62),
    "2C-SS": (0.70, 0.70, 0.70),
    "2C-MS": (0.55, 0.55, 0.57),
    "2C-LS": (0.21, 0.21, 0.44),
}

PAPER_TABLE4 = {          # db -> (known, aurum P, aurum R, cmdl P, cmdl R)
    "drugbank": (55, 0.58, 0.36, 0.33, 0.91),
    "chembl": (96, 0.09, 0.53, 0.24, 0.59),
    "chebi": (9, 0.71, 0.58, 0.71, 0.58),
}

PAPER_TABLE5 = {          # (benchmark, metric) -> per-measure values
    ("3A", "RR"): {"name": 0.82, "containment": 0.63, "numeric": 0.34,
                   "semantic": 0.62, "ensemble": 0.83},
    ("3A", "queries_answered"): {"name": 0.99, "containment": 0.99,
                                 "numeric": 0.87, "semantic": 1.00,
                                 "ensemble": 1.00},
    ("3B", "RR"): {"name": 0.44, "containment": 0.65, "numeric": 0.04,
                   "semantic": 0.73, "ensemble": 0.79},
    ("3B", "queries_answered"): {"name": 0.75, "containment": 1.00,
                                 "numeric": 0.20, "semantic": 1.00,
                                 "ensemble": 1.00},
}

PAPER_TABLE6 = {          # labeling function -> Qps
    "Content search": 75,
    "Containment": 120,
    "Semantic": 1000,
}

PAPER_TABLE2 = {          # benchmark -> (n_queries, avg answer, mQCR)
    "1A": (2360, 55, 0.05), "1B": (927, 8, 0.006), "1C": (1500, 7, 0.003),
    "2A": (1000, 17, 0.62), "2B": (147, 8, 0.08),
    "2C-SS": (150, 6, 0.71), "2C-MS": (690, 6, 0.45), "2C-LS": (790, 6, 0.02),
    "2D-drugbank": (1, 55, 0.28), "2D-chembl": (1, 96, 0.25),
    "2D-chebi": (1, 9, 0.22),
    "3A": (654, 110, 0.5), "3B": (80, 15, 0.23),
}

PAPER_TABLE1 = {          # collection -> (format, n_tables, n_des, numeric %)
    "drugbank": ("CSV", 82, 418, 0.07), "chembl": ("MySQL", 77, 543, 0.41),
    "chebi": ("MySQL", 10, 61, 0.34), "pubmed": ("Text", 0, 2000, None),
    "drugbank_synth": ("CSV", 80, 220, 0.07),
    "govt": ("CSV", 654, 8766, 0.18), "synthtext": ("Text", 0, 2360, None),
    "ss": ("CSV", 28, 243, 0.33), "ms": ("CSV", 159, 1286, 0.46),
    "ls": ("CSV", 46, 2550, 0.69), "reviews": ("Text", 0, 1500, None),
}


def _block(title: str, body: str) -> str:
    bar = "=" * len(title)
    return f"{title}\n{bar}\n{body}\n"


def render_table1(df: pd.DataFrame) -> str:
    df = df.copy()
    df["paper_tables"] = df["collection"].map(
        lambda c: PAPER_TABLE1.get(c, (None, None, None, None))[1])
    df["paper_des"] = df["collection"].map(
        lambda c: PAPER_TABLE1.get(c, (None, None, None, None))[2])
    df["paper_numeric_frac"] = df["collection"].map(
        lambda c: PAPER_TABLE1.get(c, (None, None, None, None))[3])
    return _block("Table 1 — data lake overview (measured vs paper, ~10-40x scaled)",
                  df.to_string(index=False))


def render_table2(df: pd.DataFrame) -> str:
    df = df.copy()
    for i, col in enumerate(["paper_n_queries", "paper_avg_answer", "paper_mQCR"]):
        df[col] = df["benchmark"].map(
            lambda b, i=i: PAPER_TABLE2.get(b, (None,) * 3)[i])
    return _block("Table 2 — benchmark overview (measured vs paper)",
                  df.to_string(index=False))


def render_table3(df: pd.DataFrame) -> str:
    df = df.copy()
    for i, col in enumerate(["paper_Aurum", "paper_D3L", "paper_CMDL"]):
        df[col] = df["benchmark"].map(
            lambda b, i=i: PAPER_TABLE3.get(b, (None,) * 3)[i])
    return _block("Table 3 — syntactic join discovery, precision=recall "
                  "(measured vs paper)", df.to_string(index=False))


def render_table4(df: pd.DataFrame) -> str:
    df = df.copy()
    for i, col in enumerate(["paper_known", "paper_Aurum_p", "paper_Aurum_r",
                             "paper_CMDL_p", "paper_CMDL_r"]):
        df[col] = df["database"].map(
            lambda d, i=i: PAPER_TABLE4.get(d, (None,) * 5)[i])
    return _block("Table 4 — PK-FK join discovery (measured vs paper)",
                  df.to_string(index=False))


def render_table5(df: pd.DataFrame) -> str:
    df = df.copy()
    rows = []
    for r in df.itertuples():
        paper = PAPER_TABLE5.get((r.benchmark, r.metric), {})
        rows.append({c: paper.get(c) for c in
                     ("name", "containment", "numeric", "semantic", "ensemble")})
    paper_df = pd.DataFrame(rows).add_prefix("paper_")
    return _block("Table 5 — union similarity measures, Relative Recall "
                  "(measured vs paper)",
                  pd.concat([df.reset_index(drop=True), paper_df], axis=1)
                  .to_string(index=False))


def render_table6(df: pd.DataFrame) -> str:
    df = df.copy()
    df["paper_qps"] = df["labeling_function"].map(PAPER_TABLE6)
    return _block("Table 6 — labeling-function index throughput "
                  "(measured vs paper; absolute Qps differ — in-process vs "
                  "server indexes — the ordering is the reproduced shape)",
                  df.to_string(index=False))
