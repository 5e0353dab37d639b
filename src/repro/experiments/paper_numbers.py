"""The paper's published numbers, transcribed for side-by-side diffing.

Keys use the registry's dataset slugs (alaska, as, song, music, dg,
cora, citeseer, ag, wa). Only the values actually rendered next to our
measurements in EXPERIMENTS.md are transcribed.
"""

# Table 1 — dataset statistics (#records, #entities, #attrs)
TABLE1 = {
    "alaska": {"rec": 12_000, "ent": 1_480, "attrs": 9, "types": "T(9)"},
    "as": {"rec": 2_260, "ent": 330, "attrs": 1, "types": "T(1)"},
    "song": {"rec": 4_850, "ent": 1_190, "attrs": 7, "types": "T(4), N(3)"},
    "music": {"rec": 19_300, "ent": 10_000, "attrs": 6, "types": "T(4), N(1), C(1)"},
    "dg": {"rec": 7_630, "ent": 2_350, "attrs": 4, "types": "T(3), N(1)"},
    "cora": {"rec": 1_290, "ent": 110, "attrs": 12, "types": "T(12)"},
    "citeseer": {"rec": 9_130, "ent": 2_490, "attrs": 6, "types": "T(4), N(1), C(1)"},
    "ag": {"rec": 2_160, "ent": 990, "attrs": 3, "types": "T(2), N(1)"},
    "wa": {"rec": 1_810, "ent": 850, "attrs": 5, "types": "T(3), N(1), C(1)"},
}

# Table 2 — pairwise (Ss=2) vs in-context clustering (Ss=9)
TABLE2 = {
    "cora": {
        "pairwise": {"acc": 0.88, "fp": 0.67, "cost": 0.67, "tokens_m": 3.45,
                     "time_min": 297.27, "calls": 30_230},
        "llm_cer": {"acc": 0.90, "fp": 0.71, "cost": 0.03, "tokens_m": 0.12,
                    "time_min": 5.42, "calls": 280},
    },
    "alaska": {
        "pairwise": {"acc": 0.81, "fp": 0.78, "cost": 0.43, "tokens_m": 2.29,
                     "time_min": 241.31, "calls": 24_540},
        "llm_cer": {"acc": 0.82, "fp": 0.79, "cost": 0.15, "tokens_m": 0.73,
                    "time_min": 39.57, "calls": 2_040},
    },
    "as": {
        "pairwise": {"acc": 0.70, "fp": 0.60, "cost": 0.08, "tokens_m": 0.35,
                     "time_min": 77.2, "calls": 7_850},
        "llm_cer": {"acc": 0.70, "fp": 0.63, "cost": 0.02, "tokens_m": 0.07,
                    "time_min": 8.01, "calls": 410},
    },
}

# Table 3 — record sets per hierarchy level
TABLE3 = {
    "cora": [183, 76, 15, 5],
    "alaska": [1312, 604, 101, 20, 5, 1],
    "as": [251, 107, 48, 6, 1],
}

# Table 4 — LLM-CER vs Booster / BQ / CrowdER+LLM (acc, fp, cost, tokens_m,
# time_s, calls)
TABLE4 = {
    "alaska": {
        "llm_cer": (0.82, 0.79, 0.15, 0.73, 2374.2, 2043),
        "booster": (0.71, 0.55, 0.02, 0.19, 2450.1, 2606),
        "bq": (0.33, 0.49, 1.55, 5.59, 8798.9, 8035),
        "crowder": (0.68, 0.62, 0.42, 2.04, 6547.2, 5845),
    },
    "as": {
        "llm_cer": (0.70, 0.63, 0.02, 0.07, 480.6, 413),
        "booster": (0.62, 0.62, 0.01, 0.03, 622.9, 723),
        "bq": (0.54, 0.51, 0.29, 0.34, 925.5, 842),
        "crowder": (0.52, 0.50, 0.11, 0.37, 2356.2, 2084),
    },
    "song": {
        "llm_cer": (0.72, 0.78, 0.06, 0.22, 933.2, 668),
        "booster": (0.52, 0.68, 0.02, 0.11, 903.3, 921),
        "bq": (0.59, 0.67, 0.77, 1.98, 2581.5, 2338),
        "crowder": (0.52, 0.64, 0.12, 0.43, 1856.3, 1247),
    },
    "music": {
        "llm_cer": (0.71, 0.61, 0.19, 0.90, 2388.4, 3859),
        "booster": (0.59, 0.60, 0.02, 0.15, 2585.1, 3915),
        "bq": (0.60, 0.54, 2.18, 8.96, 17515.8, 17365),
        "crowder": (0.62, 0.55, 0.39, 1.82, 4562.3, 7782),
    },
    "dg": {
        "llm_cer": (0.81, 0.70, 0.07, 0.37, 1552.4, 1285),
        "booster": (0.56, 0.68, 0.02, 0.18, 2552.2, 3085),
        "bq": (0.62, 0.63, 1.12, 3.92, 6052.2, 6456),
        "crowder": (0.72, 0.65, 0.34, 1.79, 7456.3, 6504),
    },
    "cora": {
        "llm_cer": (0.90, 0.71, 0.03, 0.12, 325.5, 279),
        "booster": (0.75, 0.60, 0.01, 0.06, 605.4, 698),
        "bq": (0.62, 0.56, 1.45, 4.23, 4085.3, 4882),
        "crowder": (0.51, 0.61, 0.07, 0.29, 598.5, 483),
    },
    "citeseer": {
        "llm_cer": (0.88, 0.95, 0.03, 0.13, 1360.8, 1302),
        "booster": (0.72, 0.78, 0.01, 0.05, 1585.2, 2169),
        "bq": (0.64, 0.79, 0.63, 1.64, 6228.9, 6420),
        "crowder": (0.60, 0.69, 0.08, 0.37, 3895.6, 3858),
    },
    "ag": {
        "llm_cer": (0.71, 0.64, 0.02, 0.07, 465.6, 452),
        "booster": (0.58, 0.55, 0.01, 0.03, 785.2, 998),
        "bq": (0.53, 0.50, 0.62, 0.86, 1658.2, 1895),
        "crowder": (0.50, 0.48, 0.09, 0.42, 1985.2, 2025),
    },
    "wa": {
        "llm_cer": (0.61, 0.56, 0.02, 0.06, 375.8, 398),
        "booster": (0.50, 0.48, 0.01, 0.03, 475.2, 825),
        "bq": (0.42, 0.41, 0.59, 0.68, 1498.5, 1585),
        "crowder": (0.51, 0.50, 0.08, 0.39, 3895.6, 1958),
    },
}

# Table 5 — optimal (Ss, Sd) vs attribute count / attribute types
TABLE5_COUNT = {
    ("cora", 4): (9, 3), ("cora", 8): (9, 4), ("cora", 12): (9, 4),
    ("alaska", 3): (9, 4), ("alaska", 6): (9, 4), ("alaska", 9): (9, 4),
}
TABLE5_TYPES = {
    ("wa", "T,N,C"): (7, 3), ("wa", "N,C"): (12, 4),
    ("wa", "T,C"): (8, 3), ("wa", "T,N"): (8, 4),
    ("citeseer", "T,N,C"): (9, 4), ("citeseer", "N,C"): (8, 4),
    ("citeseer", "T,C"): (9, 4), ("citeseer", "T,N"): (9, 4),
}

# Table 6 — end-to-end ER vs attribute count (acc, fp, cost, tokens_m,
# time_min, calls)
TABLE6 = {
    ("cora", 4): (0.82, 0.66, 0.02, 0.05, 5.04, 288),
    ("cora", 8): (0.85, 0.67, 0.03, 0.09, 5.21, 283),
    ("cora", 12): (0.90, 0.71, 0.03, 0.12, 5.43, 279),
    ("alaska", 3): (0.74, 0.74, 0.06, 0.26, 37.54, 2064),
    ("alaska", 6): (0.77, 0.75, 0.11, 0.51, 38.24, 2055),
    ("alaska", 9): (0.82, 0.79, 0.15, 0.73, 39.57, 2043),
}

# Table 7 — end-to-end ER vs attribute types (acc, fp)
TABLE7 = {
    ("wa", "original"): (0.61, 0.56),
    ("wa", "wo_textual"): (0.72, 0.66),
    ("wa", "wo_numeric"): (0.66, 0.58),
    ("wa", "wo_categorical"): (0.60, 0.54),
    ("citeseer", "original"): (0.88, 0.95),
    ("citeseer", "wo_textual"): (0.82, 0.90),
    ("citeseer", "wo_numeric"): (0.86, 0.92),
    ("citeseer", "wo_categorical"): (0.86, 0.93),
}

# Table 8 — MDG ablation (acc, fp) and Table 15 (nmi, ari)
TABLE8 = {
    "cora": {"wo_mdg": (0.60, 0.58), "w_mdg": (0.90, 0.71)},
    "alaska": {"wo_mdg": (0.35, 0.47), "w_mdg": (0.82, 0.79)},
    "as": {"wo_mdg": (0.52, 0.52), "w_mdg": (0.70, 0.63)},
}
TABLE15 = {
    "cora": {"wo_mdg": (0.61, 0.48), "w_mdg": (0.82, 0.69)},
    "alaska": {"wo_mdg": (0.52, 0.33), "w_mdg": (0.79, 0.65)},
    "as": {"wo_mdg": (0.54, 0.48), "w_mdg": (0.73, 0.62)},
}

# Appendix Table 9 — optimal key factors per LLM
TABLE9 = {"gpt-4o-mini": (9, 4), "llama-3.2-1b": (6, 3)}

# Appendix Table 10 — GPT vs Llama (acc, fp, nmi, ari, calls)
TABLE10 = {
    "alaska": {"gpt": (0.82, 0.79, 0.79, 0.65, 2043),
               "llama": (0.64, 0.46, 0.48, 0.41, 3215)},
    "as": {"gpt": (0.70, 0.63, 0.73, 0.62, 413),
           "llama": (0.42, 0.52, 0.46, 0.49, 685)},
    "song": {"gpt": (0.72, 0.78, 0.74, 0.66, 668),
             "llama": (0.45, 0.52, 0.53, 0.48, 1025)},
    "music": {"gpt": (0.71, 0.61, 0.74, 0.62, 3859),
              "llama": (0.52, 0.57, 0.53, 0.45, 5745)},
    "dg": {"gpt": (0.81, 0.70, 0.84, 0.68, 1285),
           "llama": (0.49, 0.57, 0.51, 0.49, 1865)},
    "cora": {"gpt": (0.90, 0.71, 0.82, 0.69, 279),
             "llama": (0.63, 0.48, 0.52, 0.43, 412)},
    "citeseer": {"gpt": (0.88, 0.95, 0.85, 0.74, 1302),
                 "llama": (0.61, 0.58, 0.59, 0.61, 2005)},
}

# Appendix Tables 11–13 — entity dispersion on Cora
TABLE12 = {  # 100 entities, Ed in {4, 8, 12}: (acc, fp, calls)
    4: (0.87, 0.71, 192), 8: (0.84, 0.68, 251), 12: (0.89, 0.72, 277),
}
TABLE13 = {  # ~600 records, Ed in {12, 16, 20}: (acc, fp, calls)
    12: (0.87, 0.73, 139), 16: (0.85, 0.73, 112), 20: (0.88, 0.72, 98),
}

# Appendix Table 14 — blocking ablation (acc, fp, calls)
TABLE14 = {
    "cora": {"none": (0.62, 0.58, 1996), "filter": (0.81, 0.78, 301),
             "canopy": (0.67, 0.60, 440), "lsh": (0.90, 0.71, 279)},
    "as": {"none": (0.61, 0.58, 2156), "filter": (0.68, 0.64, 402),
           "canopy": (0.66, 0.60, 526), "lsh": (0.70, 0.63, 413)},
    "alaska": {"none": (0.70, 0.69, 11542), "filter": (0.77, 0.74, 2252),
               "canopy": (0.74, 0.72, 2354), "lsh": (0.82, 0.79, 2043)},
}

# Appendix Table 16 — vs PLM matchers (acc, fp, cost)
TABLE16 = {
    "alaska": {"ours": (0.82, 0.79, 0.15),
               "ditto_20": (0.70, 0.62, 65.67), "ditto_80": (0.81, 0.77, 260.21),
               "ditto_0": (0.64, 0.55, 0.12),
               "dm_20": (0.65, 0.51, 65.81), "dm_80": (0.74, 0.70, 260.93),
               "dm_0": (0.58, 0.43, 0.14)},
    "cora": {"ours": (0.90, 0.71, 0.03),
             "ditto_20": (0.76, 0.56, 10.71), "ditto_80": (0.90, 0.72, 42.92),
             "ditto_0": (0.67, 0.48, 0.07),
             "dm_20": (0.71, 0.54, 10.74), "dm_80": (0.88, 0.70, 43.08),
             "dm_0": (0.66, 0.50, 0.06)},
    "wa": {"ours": (0.61, 0.56, 0.02),
           "ditto_20": (0.56, 0.45, 6.98), "ditto_80": (0.65, 0.60, 28.03),
           "ditto_0": (0.48, 0.40, 0.06),
           "dm_20": (0.50, 0.44, 6.89), "dm_80": (0.60, 0.57, 27.96),
           "dm_0": (0.44, 0.39, 0.06)},
}

# Appendix Table 17 — few-shot learning (acc, fp)
TABLE17 = {
    "wa": {"zero": (0.61, 0.56), "few_wo_mdg": (0.58, 0.52),
           "few_w_mdg": (0.77, 0.71)},
    "citeseer": {"zero": (0.88, 0.95), "few_wo_mdg": (0.74, 0.84),
                 "few_w_mdg": (0.90, 0.97)},
}

# Appendix Table 18 — similarity vs random merging (acc, fp, calls)
TABLE18 = {
    "cora": {"sim": (0.90, 0.71, 279), "random": (0.87, 0.69, 334),
             "random_wo_mdg": (0.61, 0.57, 254)},
    "alaska": {"sim": (0.82, 0.79, 2043), "random": (0.79, 0.77, 2308),
               "random_wo_mdg": (0.39, 0.48, 1985)},
}

# Appendix Table 19 — batch processing (acc, fp, calls)
TABLE19 = {
    "citeseer": {"batch": (0.90, 0.96, 318), "no_batch": (0.88, 0.95, 1302)},
    "wa": {"batch": (0.64, 0.57, 92), "no_batch": (0.61, 0.56, 398)},
}
