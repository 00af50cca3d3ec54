"""The paper's reported numbers, verbatim, for EXPERIMENTS.md diffs.

Table II is carried by :mod:`repro.graphgen.registry` (per-dataset paper
|V|/|E|/d_avg); this module holds Tables III and IV. ``None`` encodes the
paper's "-" (did not finish) cells.
"""
from __future__ import annotations

# Table III: cover size and runtime (seconds), k = 5.
# dataset -> {algo: (size, seconds)}
TABLE3 = {
    "WKV":  {"DARC-DV": (490, 53.8),     "BUR+": (469, 402.8),
             "TDB++": (491, 0.41)},
    "ASC":  {"DARC-DV": (620, 2.42),     "BUR+": (607, 44.01),
             "TDB++": (612, 0.11)},
    "GNU":  {"DARC-DV": (184, 1.3),      "BUR+": (180, 1.49),
             "TDB++": (193, 0.69)},
    "EU":   {"DARC-DV": (622, 114.7),    "BUR+": (609, 702.1),
             "TDB++": (627, 1.25)},
    "SAD":  {"DARC-DV": (6377, 440.1),   "BUR+": (6005, 4717.0),
             "TDB++": (6380, 3.13)},
    "WND":  {"DARC-DV": (27067, 29916.8), "BUR+": (23853, 28953.3),
             "TDB++": (24290, 2.67)},
    "CT":   {"DARC-DV": (1621, 37.03),   "BUR+": (1610, 43.0),
             "TDB++": (1611, 16.2)},
    "WST":  {"DARC-DV": (31253, 140.7),  "BUR+": (30811, 275.6),
             "TDB++": (31148, 2.99)},
    "LOAN": {"DARC-DV": (332, 184.5),    "BUR+": (320, 450.7),
             "TDB++": (347, 127.9)},
    "WIT":  {"DARC-DV": (7040, 2296.8),  "BUR+": (6923, 4708.3),
             "TDB++": (6894, 56.3)},
    "WGO":  {"DARC-DV": (130382, 42.2),  "BUR+": (129009, 110.8),
             "TDB++": (129421, 5.99)},
    "WBS":  {"DARC-DV": (98570, 3571.4), "BUR+": (94817, 12739.0),
             "TDB++": (100668, 6.96)},
    "FLK":  {"DARC-DV": None, "BUR+": None, "TDB++": (206912, 92.3)},
    "LJ":   {"DARC-DV": None, "BUR+": None, "TDB++": (39183, 20466.8)},
    "WKP":  {"DARC-DV": None, "BUR+": None, "TDB++": (685759, 4132.0)},
    "TW":   {"DARC-DV": None, "BUR+": None, "TDB++": (3731522, 89634.0)},
}

# Table IV: TDB++ cover size, k = 5, without vs with 2-cycles.
# dataset -> (no_2cycle, with_2cycle, ratio)
TABLE4 = {
    "WKV":  (491, 714, 1.45),
    "ASC":  (612, 5285, 8.64),
    "GNU":  (193, 222, 1.15),
    "EU":   (627, 1270, 2.03),
    "SAD":  (6380, 27461, 4.30),
    "WND":  (24290, 51466, 2.12),
    "CT":   (1611, 7615, 4.73),
    "WST":  (31148, 116065, 3.73),
    "LOAN": (347, 568, 1.64),
    "WIT":  (6894, 21781, 3.16),
    "WGO":  (129421, 217799, 1.68),
    "WBS":  (100668, 256281, 2.55),
}
