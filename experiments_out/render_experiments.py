"""Render experiments_out/*.json into the measured-results tables that
EXPERIMENTS.md embeds. Run after run_sweeps.py."""
import json
import os

OUT = os.path.dirname(os.path.abspath(__file__))


def load(name):
    path = os.path.join(OUT, name + ".json")
    if not os.path.exists(path):
        return None
    with open(path) as f:
        return json.load(f)


def md(rows, cols):
    out = ["| " + " | ".join(cols) + " |", "|" + "---|" * len(cols)]
    for r in rows:
        cells = []
        for c in cols:
            v = r.get(c)
            if v is None:
                cells.append("DNF" if c in ("seconds", "n_mups", "n_input", "n_output") else "-")
            elif isinstance(v, float):
                cells.append(f"{v:.2f}" if c == "seconds" else f"{v:g}")
            else:
                cells.append(str(v))
        out.append("| " + " | ".join(cells) + " |")
    return "\n".join(out)


SPECS = [
    ("t1_compas", "T1 — COMPAS coverage audit", ["metric", "value"]),
    ("t2_classifier", "T2 — classifier effect (Fig 11)",
     ["setting", "hf_in_training", "accuracy", "f1"]),
    ("t3_airbnb_threshold", "T3 — MUP identification vs threshold, AirBnB (Fig 12)",
     ["rate", "tau", "algorithm", "seconds", "n_mups"]),
    ("t4_bluenile_threshold", "T4 — MUP identification vs threshold, BlueNile (Fig 13)",
     ["rate", "tau", "algorithm", "seconds", "n_mups"]),
    ("t5_datasize", "T5 — MUP identification vs data size (Fig 14)",
     ["n", "tau", "algorithm", "seconds", "n_mups"]),
    ("t6_dimensions", "T6 — MUP identification vs dimensions (Fig 15)",
     ["d", "tau", "algorithm", "seconds", "n_mups"]),
    ("t7_level_limited", "T7 — level-limited DEEPDIVER (Fig 16)",
     ["d", "tau", "max_level", "seconds", "n_mups"]),
    ("t8_enhance_threshold", "T8 — coverage enhancement vs threshold (Fig 17)",
     ["rate", "tau", "lam", "algorithm", "seconds", "n_input", "n_output"]),
    ("t9_enhance_dimensions", "T9 — coverage enhancement vs dimensions (Figs 18–19)",
     ["d", "tau", "lam", "algorithm", "seconds", "n_input", "n_output"]),
]


def main():
    for name, title, cols in SPECS:
        rows = load(name)
        print(f"\n### Measured: {title}\n")
        if rows is None:
            print("(not yet collected)")
        else:
            print(md(rows, cols))


if __name__ == "__main__":
    main()
