"""Table 2 — dataset statistics, for the scaled synthetic stand-ins.

For each preset we report the paper's statistics, the expected scaled
values, and the realized statistics of the generated database — so a
reader can confirm the generators match the shape they claim to match.
"""
from __future__ import annotations

import pandas as pd

from ..synth_data import SET_PRESETS, dataset

# fs/pmc are the paper's large-scale (disk-based) datasets; we scale
# them further down than the four memory-based ones.
DEFAULT_SCALES = {
    "kosarak": 0.002,
    "livej": 0.002,
    "dblp": 0.002,
    "aol": 0.002,
    "fs": 0.0002,
    "pmc": 0.00002,
}


def run(scales: dict | None = None, seed: int = 7) -> pd.DataFrame:
    scales = scales or DEFAULT_SCALES
    rows = []
    for name, scale in scales.items():
        p = SET_PRESETS[name]
        db = dataset(name, scale=scale, seed=seed)
        st = db.stats()
        rows.append(
            {
                "dataset": name,
                "scale": scale,
                "paper_n_sets": p["n_sets"],
                "paper_n_tokens": p["n_tokens"],
                "paper_avg_size": p["avg_size"],
                "paper_max_size": p["max_size"],
                "gen_n_sets": st["n_sets"],
                "gen_n_tokens": st["n_tokens"],
                "gen_avg_size": round(st["avg_size"], 2),
                "gen_max_size": st["max_size"],
                "gen_min_size": st["min_size"],
            }
        )
    return pd.DataFrame(rows)
