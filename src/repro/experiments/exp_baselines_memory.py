"""§7.6 (Figure 12) — memory-based comparison to search baselines.

Per dataset and engine (LES³, DualTrans, InvIdx, Brute-force), mean
query time for range queries over a δ sweep and kNN over a k sweep, all
engines driver-resident (the paper's memory-based setting). Paper
shape: LES³ fastest overall (2–20×); InvIdx close at high δ but poor on
kNN / large sets; DualTrans pays R-tree scan cost. Reproduced shape:
LES³ beats Brute and DualTrans throughout; InvIdx stays fast at our
1/100 scale because its postings are ~100× shorter than the paper's
while LES³'s per-group candidate floor (~|D|·0.5% sets/group) does not
shrink — the deviation is analyzed in EXPERIMENTS.md.

A Spark variant (``run_spark``) compares the distributed batch engines
(SparkLES3 / SparkInvIdx / SparkBrute) end-to-end on one dataset —
that is the distributed-dataflow centerpiece of this reproduction.
"""
from __future__ import annotations

import time

import pandas as pd

from ..baselines.brute import LocalBrute, SparkBrute
from ..baselines.dualtrans import DualTransEngine
from ..baselines.invidx import LocalInvIdx, SparkInvIdx
from ..core.search import SparkLES3, attach_groups
from ..synth_data import dataset, sample_queries, sets_df
from .common import build_les3, timed_queries

DELTAS = (0.9, 0.8, 0.7, 0.6, 0.5)
KS = (1, 10, 50, 100)


# scales chosen so candidate-verification volume dominates per-call
# overheads (the regime the paper measures); |D| ranges 10k-32k
DEFAULT_SCALES = {"kosarak": 0.01, "livej": 0.005, "aol": 0.002}


def _engines(db, n_groups, seed):
    b = build_les3(db, n_groups=n_groups, seed=seed)
    return {
        "LES3": b.engine,
        "DualTrans": DualTransEngine(db.sets, db.n_tokens, d=16),
        "InvIdx": LocalInvIdx(db.sets, db.n_tokens),
        "Brute": LocalBrute(db.sets),
    }


def run(
    *,
    datasets: tuple = ("kosarak", "livej", "aol"),
    scale: float | None = None,
    n_groups: int | None = None,
    n_queries: int = 40,
    deltas: tuple = DELTAS,
    ks: tuple = KS,
    seed: int = 0,
) -> pd.DataFrame:
    rows = []
    for name in datasets:
        db = dataset(name, scale=scale or DEFAULT_SCALES.get(name, 0.002), seed=seed)
        queries = sample_queries(db, n=n_queries, seed=seed + 1)
        engines = _engines(db, n_groups, seed)
        for ename, eng in engines.items():
            for d in deltas:
                t, stats, _ = timed_queries(lambda q: eng.range(q, d), queries)
                rows.append(
                    {
                        "dataset": name,
                        "engine": ename,
                        "query": "range",
                        "param": d,
                        "ms": round(t * 1e3, 3),
                        "mean_candidates": round(
                            sum(s.n_candidates for s in stats) / len(stats), 1
                        ),
                    }
                )
            for k in ks:
                t, stats, _ = timed_queries(lambda q: eng.knn(q, k), queries)
                rows.append(
                    {
                        "dataset": name,
                        "engine": ename,
                        "query": "knn",
                        "param": k,
                        "ms": round(t * 1e3, 3),
                        "mean_candidates": round(
                            sum(s.n_candidates for s in stats) / len(stats), 1
                        ),
                    }
                )
    return pd.DataFrame(rows)


def run_spark(
    spark,
    *,
    name: str = "kosarak",
    scale: float = 0.002,
    n_groups: int | None = None,
    n_queries: int = 30,
    delta: float = 0.7,
    k: int = 10,
    seed: int = 0,
) -> pd.DataFrame:
    """Distributed batch engines on one dataset: one row per engine/query
    type with total batch wall-clock."""
    db = dataset(name, scale=scale, seed=seed)
    queries = sample_queries(db, n=n_queries, seed=seed + 1)
    b = build_les3(db, n_groups=n_groups, seed=seed)
    data = attach_groups(spark, sets_df(spark, db), b.l2p.groups).cache()
    data.count()
    les3 = SparkLES3(spark, data, b.tgm)
    inv = SparkInvIdx(spark, data, db.n_tokens)
    brute = SparkBrute(spark, data)
    rows = []

    def timed(label, query, fn):
        t0 = time.perf_counter()
        fn()
        rows.append(
            {
                "engine": label,
                "query": query,
                "param": delta if query == "range" else k,
                "batch_seconds": round(time.perf_counter() - t0, 3),
                "n_queries": len(queries),
            }
        )

    timed("SparkLES3", "range", lambda: les3.range_batch(queries, delta))
    timed("SparkInvIdx", "range", lambda: inv.range_batch(queries, delta))
    timed("SparkBrute", "range", lambda: brute.range_batch(queries, delta))
    timed("SparkLES3", "knn", lambda: les3.knn_batch(queries, k))
    timed("SparkInvIdx", "knn", lambda: inv.knn_batch(queries, k))
    timed("SparkBrute", "knn", lambda: brute.knn_batch(queries, k))
    return pd.DataFrame(rows)
