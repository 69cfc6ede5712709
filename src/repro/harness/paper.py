"""The paper's reported numbers, for side-by-side comparison.

Keys are source-group names from ``repro.lakes.registry``. All values
are as printed in the VLDB'23 paper (text-davinci-003 unless noted).
EXPERIMENTS.md diffs these against our measurements; the reproduction
targets *shape* (orderings, rough factors), not absolute equality.
"""

# Table 1 — EVAPORATE-CODE+ on all documents: ClosedIE Text F1, OpenIE R/P/F1
TABLE1 = {
    "fda": {"closed_f1": 80.1, "open_r": 58.9, "open_p": 67.2, "open_f1": 62.8},
    "enron": {"closed_f1": 93.3, "open_r": 80.3, "open_p": 94.6, "open_f1": 86.9},
    "nba": {"closed_f1": 84.7, "open_r": 55.7, "open_p": 88.2, "open_f1": 68.2},
    "swde_movie": {"closed_f1": 79.5, "open_r": 48.5, "open_p": 71.0, "open_f1": 56.8},
    "swde_university": {"closed_f1": 73.7, "open_r": 50.9, "open_p": 71.4, "open_f1": 59.0},
    "average": {"closed_f1": 82.3, "open_r": 58.9, "open_p": 78.5, "open_f1": 66.7},
}

# Table 2 — SWDE benchmark vs SoTA (baselines as reported in Deng et al.)
TABLE2 = {
    "swde_movie": {
        "zeroshot_ceres": {"closed": 49.3, "open": 50.0},
        "roberta_base": {"closed": 47.7, "open": 35.6},
        "roberta_structural": {"closed": None, "open": 39.9},
        "dom_lm": {"closed": 71.9, "open": 54.1},
        "direct": {"closed": 84.4, "open": 37.4},
        "code": {"closed": 55.0, "open": 33.0},
        "code_plus": {"closed": 79.5, "open": 56.8},
    },
    "swde_university": {
        "zeroshot_ceres": {"closed": 36.6, "open": 50.0},
        "roberta_base": {"closed": 46.5, "open": 38.0},
        "roberta_structural": {"closed": None, "open": 42.3},
        "dom_lm": {"closed": 68.0, "open": 55.2},
        "direct": {"closed": 72.6, "open": 54.4},
        "code": {"closed": 40.5, "open": 22.2},
        "code_plus": {"closed": 73.7, "open": 59.0},
    },
}

# Table 3 — Direct vs Code+ on 10-doc samples; cost per 10k documents
TABLE3 = {
    "fda": {"direct_f1": 48.6, "direct_mtok": 145.6, "direct_usd": 2900,
            "code_f1": 64.9, "code_mtok": 1.9, "code_usd": 38,
            "delta_f1": 16.3, "reduction": 77},
    "enron": {"direct_f1": 90.9, "direct_mtok": 21.2, "direct_usd": 425,
              "code_f1": 87.1, "code_mtok": 0.6, "code_usd": 12,
              "delta_f1": -3.8, "reduction": 35},
    "nba": {"direct_f1": 45.9, "direct_mtok": 650.1, "direct_usd": 13000,
            "code_f1": 68.6, "code_mtok": 3.0, "code_usd": 60,
            "delta_f1": 22.7, "reduction": 217},
    "swde_movie": {"direct_f1": 37.4, "direct_mtok": 282.9, "direct_usd": 5660,
                   "code_f1": 57.4, "code_mtok": 2.3, "code_usd": 46,
                   "delta_f1": 38.0, "reduction": 123},
    "swde_university": {"direct_f1": 54.4, "direct_mtok": 190.1, "direct_usd": 3800,
                        "code_f1": 59.5, "code_mtok": 1.9, "code_usd": 38,
                        "delta_f1": 5.1, "reduction": 100},
    "average": {"direct_f1": 55.4, "direct_mtok": 258, "direct_usd": 5157,
                "code_f1": 67.5, "code_mtok": 1.9, "code_usd": 39,
                "delta_f1": 12.1, "reduction": 110},
}

# Table 4 — aggregation ablation (OpenIE Pair F1)
TABLE4 = {
    "fda": {"mv": 52.9, "ws": 51.1, "ws_filter": 55.0, "ws_abstain_filter": 62.8},
    "enron": {"mv": 81.4, "ws": 82.7, "ws_filter": 86.9, "ws_abstain_filter": 86.9},
    "nba": {"mv": 59.5, "ws": 64.9, "ws_filter": 68.4, "ws_abstain_filter": 68.2},
    "swde_movie": {"mv": 44.3, "ws": 46.3, "ws_filter": 56.6, "ws_abstain_filter": 56.8},
    "swde_university": {"mv": 42.7, "ws": 43.5, "ws_filter": 57.3, "ws_abstain_filter": 59.0},
    "average": {"mv": 56.2, "ws": 57.7, "ws_filter": 64.8, "ws_abstain_filter": 66.7},
}

# Table 5 — alternate LLMs (OpenIE Pair F1 on 10-doc samples) + schema F1@k
TABLE5 = {
    "gpt4": {"direct": {"fda": 59.2, "nba": 40.5, "swde_movie": 35.1,
                        "swde_university": 56.1, "enron": 92.7},
             "code_plus": {"fda": 57.5, "nba": 61.4, "swde_movie": 54.9,
                           "swde_university": 57.2, "enron": 85.5},
             "schema_f1": 67.3},
    "claude": {"direct": {"fda": 45.1, "nba": 20.6, "swde_movie": 27.5,
                          "swde_university": 44.3, "enron": 88.1},
               "code_plus": {"fda": 44.4, "nba": 33.5, "swde_movie": 38.7,
                             "swde_university": 30.4, "enron": 84.7},
               "schema_f1": 69.0},
    "jumbo": {"direct": {"fda": 25.9, "nba": 0.0, "swde_movie": 13.3,
                         "swde_university": 29.2, "enron": 90.3},
              "code_plus": {"fda": 1.2, "nba": 0.0, "swde_movie": 20.6,
                            "swde_university": 18.6, "enron": 85.7},
              "schema_f1": 62.3},
    "davinci": {"schema_f1": 71.9},
}

# Table 6 (Appendix C.1) — DeBERTaV3+SQuAD2 span-extractor ClosedIE F1
TABLE6 = {
    "enron": 53.7, "fda": 56.5, "nba": 50.2,
    "swde_movie": 43.5, "swde_university": 45.3,
}

# Table 7 (Appendix C.2) — direct LLM F ClosedIE quality + cost per 10k docs
TABLE7 = {
    "enron": {"n_attrs": 15, "f1": 85.3, "mtok": 140, "usd": 2790},
    "fda": {"n_attrs": 16, "f1": 78.0, "mtok": 241, "usd": 4816},
    "nba": {"n_attrs": 19, "f1": 84.6, "mtok": 328, "usd": 6559},
    "swde_movie": {"n_attrs": 25, "f1": 84.4, "mtok": 359, "usd": 7174},
    "swde_university": {"n_attrs": 33, "f1": 72.6, "mtok": 379, "usd": 7586},
    "average": {"n_attrs": 21.6, "f1": 79.9, "mtok": 289, "usd": 5785},
}

# Figure 3 / §3.2.2 text — cost crossovers
FIGURE3 = {"crossover_docs": 40, "crossover_attrs": 2500}
