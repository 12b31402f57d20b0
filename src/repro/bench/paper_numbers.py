"""The paper's published evaluation numbers (Tables 6–10), kept next to
the harness so every reproduction run can print paper-vs-measured rows
(EXPERIMENTS.md is generated from these plus our measurements).

"-" cells (infeasible on the authors' 32GB machine) are ``None``.
"""
from __future__ import annotations

#: Table 6 — dataset characteristics: name → (nodes, interactions, avg r.q).
PAPER_TABLE6 = {
    "bitcoin": (12_000_000, 45_500_000, 34.4),
    "ctu": (608_000, 2_800_000, 19_200.0),
    "prosper": (100_000, 3_080_000, 76.0),
    "flights": (629, 5_700_000, 125.0),
    "taxis": (255, 231_000, 1.53),
}

#: Table 7 — runtime (seconds) per selection policy.
PAPER_TABLE7 = {
    #             noprov   lrb     mrb    lifo   fifo   dense  sparse
    "bitcoin": (0.19, 31.77, 9.17, 3.10, 3.90, None, None),
    "ctu": (0.010, 0.16, 0.19, 0.08, 0.11, None, None),
    "prosper": (0.006, 0.089, 0.082, 0.055, 0.08, None, 15.7),
    "flights": (0.009, 0.75, 0.77, 0.077, 0.15, 1.58, 2.91),
    "taxis": (0.0005, 0.014, 0.015, 0.002, 0.004, 0.032, 0.05),
}

#: Table 8 — peak memory (bytes, decimal units: the paper's NoProv and
#: dense columns are exact in decimal MB — 12M×8B = 96MB, 629²×8B = 3.16MB).
_MB = 1e6
_KB = 1e3
PAPER_TABLE8 = {
    "bitcoin": (96 * _MB, 891 * _MB, 892 * _MB, 536 * _MB, 535 * _MB, None, None),
    "ctu": (4.85 * _MB, 56.4 * _MB, 56.4 * _MB, 33.8 * _MB, 33.8 * _MB, None, None),
    "prosper": (800 * _KB, 61.4 * _MB, 61.4 * _MB, 36.8 * _MB, 36.8 * _MB, None, 2400 * _MB),
    "flights": (5 * _KB, 0.90 * _MB, 1.05 * _MB, 1.05 * _MB, 1.05 * _MB, 3.16 * _MB, 2.32 * _MB),
    "taxis": (2 * _KB, 0.93 * _MB, 1.02 * _MB, 0.59 * _MB, 0.6 * _MB, 0.52 * _MB, 0.44 * _MB),
}

TABLE7_COLUMNS = ("noprov", "lrb", "mrb", "lifo", "fifo", "prop_dense", "prop_sparse")

#: Table 9 — budget-based provenance shrink stats:
#: dataset → {C: (avg_shrinks, pct_vertices_shrunk)}.
PAPER_TABLE9 = {
    "bitcoin": {10: (1.94, 18.38), 50: (1.51, 14.79), 100: (1.43, 14.21)},
    "ctu": {
        10: (7.27, 31.07),
        50: (5.1, 28.68),
        100: (4.77, 27.94),
        200: (4.53, 26.6),
        500: (4.34, 25.24),
        1000: (4.3, 25.02),
    },
    "prosper": {
        10: (20.67, 94.7),
        50: (4.77, 79.29),
        100: (2.97, 69.09),
        200: (2.1, 59.16),
        500: (1.5, 47.64),
        1000: (1.23, 41.39),
    },
}

#: Table 10 — LIFO path tracking:
#: dataset → (time s, mem entries MB, mem paths MB, total MB, avg path len).
PAPER_TABLE10 = {
    "bitcoin": (13.35, 534.62, 847.50, 1382.13, 4.75),
    "ctu": (0.36, 33.87, 7.16, 41.03, 0.63),
    "prosper": (0.4, 36.85, 0.74, 37.59, 0.06),
    "flights": (0.17, 0.627, 57.09, 57.72, 273.17),
    "taxis": (0.008, 0.58, 1.09, 1.68, 5.55),
}
