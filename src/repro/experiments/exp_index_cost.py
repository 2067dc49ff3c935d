"""§7.6 (Figure 11) — index size and construction time per method.

For each dataset: TGM (LES³) vs DualTrans (R-tree + vectors) vs InvIdx
(postings). Expected shape: TGM is up to ~90% smaller; its construction
time is dominated by one-off L2P training.
"""
from __future__ import annotations

import time

import pandas as pd

from ..baselines.dualtrans import DualTransEngine
from ..baselines.invidx import LocalInvIdx
from ..synth_data import dataset
from .common import build_les3

DATASETS = ("kosarak", "livej", "dblp", "aol")


def run(
    *, scale: float = 0.001, n_groups: int = 32, dual_d: int = 16, seed: int = 0
) -> pd.DataFrame:
    rows = []
    for name in DATASETS:
        db = dataset(name, scale=scale, seed=seed)
        data_bytes = sum(8 * len(s) for s in db.sets)

        b = build_les3(db, n_groups=n_groups, seed=seed)
        les3_s = b.rep_seconds + b.partition_seconds

        t0 = time.perf_counter()
        dt = DualTransEngine(db.sets, db.n_tokens, d=dual_d)
        dual_s = time.perf_counter() - t0

        t0 = time.perf_counter()
        inv = LocalInvIdx(db.sets, db.n_tokens)
        inv_s = time.perf_counter() - t0

        rows.append(
            {
                "dataset": name,
                "data_bytes": data_bytes,
                "les3_bytes": b.tgm.index_bytes(),
                "dualtrans_bytes": dt.index_bytes(),
                "invidx_bytes": inv.index_bytes(),
                "les3_build_s": round(les3_s, 3),
                "dualtrans_build_s": round(dual_s, 3),
                "invidx_build_s": round(inv_s, 3),
            }
        )
    return pd.DataFrame(rows)
