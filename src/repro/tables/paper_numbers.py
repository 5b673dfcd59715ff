"""The paper's reported numbers (Tables 1-4), for diffing in EXPERIMENTS.md.

Transcribed from the EDBT 2019 paper text. ``None`` marks cells the
paper leaves empty ('-'). LINDA and RiMOM are quoted numbers the paper
itself took from the original publications (it could not run them);
we therefore quote, not re-measure, them (DESIGN.md section 4).
"""

DATASETS = ("restaurant", "rexa_dblp", "bbc_dbpedia", "yago_imdb")

# --- Table 1: dataset statistics -------------------------------------------
TABLE1 = {
    "restaurant": {
        "e1_entities": 339, "e2_entities": 2_256,
        "e1_triples": 1_130, "e2_triples": 7_519,
        "e1_avg_tokens": 20.44, "e2_avg_tokens": 20.61,
        "attributes": "7/7", "relations": "2/2",
        "types": "3/3", "vocabularies": "2/2", "matches": 89,
    },
    "rexa_dblp": {
        "e1_entities": 18_492, "e2_entities": 2_650_832,
        "e1_triples": 87_519, "e2_triples": 14_936_373,
        "e1_avg_tokens": 40.71, "e2_avg_tokens": 59.24,
        "attributes": "114/145", "relations": "103/123",
        "types": "4/11", "vocabularies": "4/4", "matches": 1_309,
    },
    "bbc_dbpedia": {
        "e1_entities": 58_793, "e2_entities": 256_602,
        "e1_triples": 456_304, "e2_triples": 8_044_247,
        "e1_avg_tokens": 81.19, "e2_avg_tokens": 324.75,
        "attributes": "27/10953", "relations": "9/953",
        "types": "4/59801", "vocabularies": "4/6", "matches": 22_770,
    },
    "yago_imdb": {
        "e1_entities": 5_208_100, "e2_entities": 5_328_774,
        "e1_triples": 27_547_595, "e2_triples": 47_843_680,
        "e1_avg_tokens": 15.56, "e2_avg_tokens": 12.49,
        "attributes": "65/29", "relations": "4/13",
        "types": "11767/15", "vocabularies": "3/1", "matches": 56_683,
    },
}

# --- Table 2: block statistics ---------------------------------------------
TABLE2 = {
    "restaurant": {
        "n_name_blocks": 83, "n_token_blocks": 625,
        "name_comparisons": 83, "token_comparisons": 1.80e3,
        "cartesian": 7.65e5,
        "precision": 4.95, "recall": 100.00, "f1": 9.43,
    },
    "rexa_dblp": {
        "n_name_blocks": 15_912, "n_token_blocks": 22_297,
        "name_comparisons": 6.71e7, "token_comparisons": 6.54e8,
        "cartesian": 4.90e10,
        "precision": 1.81e-4, "recall": 99.77, "f1": 3.62e-4,
    },
    "bbc_dbpedia": {
        "n_name_blocks": 28_844, "n_token_blocks": 54_380,
        "name_comparisons": 1.25e7, "token_comparisons": 1.73e8,
        "cartesian": 1.51e10,
        "precision": 0.01, "recall": 99.83, "f1": 0.02,
    },
    "yago_imdb": {
        "n_name_blocks": 580_518, "n_token_blocks": 495_973,
        "name_comparisons": 6.59e6, "token_comparisons": 2.28e10,
        "cartesian": 2.78e13,
        "precision": 2.46e-4, "recall": 99.35, "f1": 4.92e-4,
    },
}

# --- Table 3: effectiveness vs baselines (P / R / F1, percent) -------------
TABLE3 = {
    "sigma": {
        "restaurant": (99, 94, 97),
        "rexa_dblp": (97, 90, 94),
        "bbc_dbpedia": None,
        "yago_imdb": (98, 85, 91),
    },
    "linda": {
        "restaurant": (100, 63, 77),
        "rexa_dblp": None,
        "bbc_dbpedia": None,
        "yago_imdb": None,
    },
    "rimom": {
        "restaurant": (86, 77, 81),
        "rexa_dblp": (80, 72, 76),
        "bbc_dbpedia": None,
        "yago_imdb": None,
    },
    "paris": {
        "restaurant": (95, 88, 91),
        "rexa_dblp": (93.95, 89, 91.41),
        "bbc_dbpedia": (19.40, 0.29, 0.51),
        "yago_imdb": (94, 90, 92),
    },
    "bsl": {
        "restaurant": (100, 100, 100),
        "rexa_dblp": (96.57, 83.96, 89.82),
        "bbc_dbpedia": (85.20, 36.09, 50.70),
        "yago_imdb": (11.68, 4.87, 6.88),
    },
    "minoaner": {
        "restaurant": (100, 100, 100),
        "rexa_dblp": (96.74, 95.34, 96.04),
        "bbc_dbpedia": (91.44, 88.55, 89.97),
        "yago_imdb": (91.02, 90.57, 90.79),
    },
}

# --- Table 4: matching-rule ablation (P / R / F1, percent) -----------------
TABLE4 = {
    "R1": {
        "restaurant": (100, 68.54, 81.33),
        "rexa_dblp": (97.36, 87.47, 92.15),
        "bbc_dbpedia": (99.85, 66.11, 79.55),
        "yago_imdb": (97.55, 66.53, 79.11),
    },
    "R2": {
        "restaurant": (100, 100, 100),
        "rexa_dblp": (96.15, 30.56, 46.38),
        "bbc_dbpedia": (90.73, 37.01, 52.66),
        "yago_imdb": (98.02, 69.14, 81.08),
    },
    "R3": {
        "restaurant": (98.88, 98.88, 98.88),
        "rexa_dblp": (94.73, 94.73, 94.73),
        "bbc_dbpedia": (81.49, 81.49, 81.49),
        "yago_imdb": (90.51, 90.50, 90.50),
    },
    "no_R4": {
        "restaurant": (100, 100, 100),
        "rexa_dblp": (96.03, 96.03, 96.03),
        "bbc_dbpedia": (89.93, 89.93, 89.93),
        "yago_imdb": (90.58, 90.57, 90.58),
    },
    "no_neighbors": {
        "restaurant": (100, 100, 100),
        "rexa_dblp": (96.59, 95.26, 95.92),
        "bbc_dbpedia": (89.22, 85.36, 87.25),
        "yago_imdb": (88.05, 87.42, 87.73),
    },
}
