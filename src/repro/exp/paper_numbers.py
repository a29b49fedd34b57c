"""The paper's published numbers, transcribed for EXPERIMENTS.md diffs.

Source: Qiu, Sun, Chen, Wang — "Enhance Stability of Network by Edge
Anchor", ICDE 2025, Tables III, IV, V (default budget b=100 for
Table III, b=50 for Table V; 2000 trials for the random baselines).
"""
from __future__ import annotations

#: Table III — dataset statistics and evaluation at b=100.
#: name -> (vertices, edges, kmax, supmax,
#:          gain_rand, gain_sup, gain_tur, gain_gas,
#:          time_base_s, time_base_plus_s, time_gas_s)  (None = "-")
PAPER_TABLE3 = {
    "college": (1_899, 13_838, 7, 74, 111, 134, 184, 769, 98_547.74, 88.91, 76.60),
    "facebook": (4_039, 88_234, 97, 293, 8_891, 525, 9_948, 21_980, None, 17_788.76, 3_122.52),
    "brightkite": (58_228, 214_078, 43, 272, 1_271, 235, 1_526, 6_163, None, 3_388.98, 1_054.22),
    "gowalla": (196_591, 950_327, 29, 1_297, 577, 769, 1_042, 11_492, None, 24_414.38, 6_732.54),
    "youtube": (1_134_890, 2_987_624, 19, 4_034, 358, 823, 1_611, 10_281, None, 62_391.04, 22_550.14),
    "google": (875_713, 4_322_051, 44, 3_086, 91, 95, 147, 5_640, None, 76_856.74, 15_714.23),
    "patents": (3_774_768, 16_518_947, 36, 591, 59, 37, 146, 10_870, None, 194_103.18, 70_802.71),
    "pokec": (1_632_803, 22_301_964, 29, 5_566, 302, 436, 809, 28_208, None, None, 210_571.13),
}

#: Table IV — upward-route sizes in GAS round 1.
#: name -> (min, max, sum, avg)
PAPER_TABLE4 = {
    "college": (0, 60, 32_314, 2.34),
    "facebook": (0, 8_629, 1_478_230, 14.55),
    "brightkite": (0, 1_291, 551_448, 2.58),
    "gowalla": (0, 633, 3_451_244, 3.63),
    "youtube": (0, 1_555, 5_533_322, 1.85),
    "google": (0, 273, 4_829_848, 1.12),
    "patents": (0, 2_297, 10_472_823, 0.63),
    "pokec": (0, 971, 64_276_694, 2.88),
}

#: Table V — AKT / GAS trussness-gain ratios at b=50.
#: name -> (avg_gain_pct, max_gain_pct)
PAPER_TABLE5 = {
    "college": (51, 74),
    "facebook": (5, 8),
    "brightkite": (15, 23),
    "gowalla": (20, 31),
    "youtube": (25, 42),
    "google": (27, 35),
    "patents": (25, 47),
    "pokec": (26, 47),
}
