"""Graph reconstruction (paper Section 5.3).

Score a candidate set S of node pairs (all pairs on small graphs, a uniform
sample otherwise), rank by score, and measure precision@K: the fraction of
the top-K pairs that are actual edges of G.

Two scorers:
* :func:`topk_pairs_numpy` — blocked dense scoring on the driver (oracle);
* :func:`topk_pairs_spark` — distributed: each partition of source nodes
  scores against the broadcast right-embedding matrix with mapInPandas,
  keeps its local top-K, and a global sort merges them. Parity-tested
  against the numpy scorer.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.embedding import Embedding
from repro.graphs.edgelist import LocalGraph
from repro.tasks.metrics import precision_at_k


def _right(emb: Embedding) -> np.ndarray:
    return emb.Y if emb.dual else emb.X


def topk_pairs_numpy(
    emb: Embedding, g: LocalGraph, k: int, *, block: int = 1024
) -> np.ndarray:
    """Top-k scored pairs over all candidate pairs: ordered (u != v) for
    directed graphs, u < v otherwise. Returns (k, 2) int array, ranked."""
    n = g.n
    X, R = emb.X, _right(emb)
    best_s: list[np.ndarray] = []
    best_p: list[np.ndarray] = []
    for lo in range(0, n, block):
        hi = min(lo + block, n)
        S = X[lo:hi] @ R.T
        rows = np.arange(lo, hi)
        S[np.arange(hi - lo), rows] = -np.inf  # no self pairs
        if not g.directed:
            # keep u < v only
            cols = np.arange(n)
            S[cols[None, :] <= rows[:, None]] = -np.inf
        flat = S.ravel()
        take = min(k, flat.size)
        idx = np.argpartition(flat, -take)[-take:]
        best_s.append(flat[idx])
        u = rows[idx // n]
        v = idx % n
        best_p.append(np.stack([u, v], axis=1))
    s = np.concatenate(best_s)
    p = np.vstack(best_p)
    order = np.argsort(-s, kind="stable")[:k]
    return p[order]


def topk_pairs_spark(
    spark: SparkSession, emb: Embedding, g: LocalGraph, k: int
) -> np.ndarray:
    """Distributed top-k candidate pairs (same semantics as the numpy
    scorer): partitions of source nodes each keep a local top-k."""
    n, directed = g.n, g.directed
    bX = spark.sparkContext.broadcast(emb.X)
    bR = spark.sparkContext.broadcast(_right(emb))

    def score_block(batches):
        X, R = bX.value, bR.value
        for pdf in batches:
            rows = pdf["id"].to_numpy()
            S = X[rows] @ R.T
            S[np.arange(len(rows)), rows] = -np.inf
            if not directed:
                cols = np.arange(n)
                S[cols[None, :] <= rows[:, None]] = -np.inf
            flat = S.ravel()
            take = min(k, flat.size)
            idx = np.argpartition(flat, -take)[-take:]
            yield pd.DataFrame(
                {
                    "u": rows[idx // n],
                    "v": idx % n,
                    "score": flat[idx],
                }
            )

    out = (
        spark.range(n)
        .repartition(max(2, n // 2048))
        .mapInPandas(score_block, schema="u long, v long, score double")
        .orderBy(F.desc("score"), "u", "v")
        .limit(k)
        .toPandas()
    )
    return out[["u", "v"]].to_numpy()


def sample_candidate_pairs(
    g: LocalGraph, count: int, seed: int = 0
) -> np.ndarray:
    """Uniform sample of candidate pairs (edges included), for the paper's
    1%-of-all-pairs protocol on larger graphs."""
    rng = np.random.default_rng(seed)
    n = g.n
    pairs: list[np.ndarray] = []
    seen: set[int] = set()
    have = 0
    while have < count:
        batch = (count - have) * 2 + 32
        u = rng.integers(0, n, batch)
        v = rng.integers(0, n, batch)
        ok = u != v
        u, v = u[ok], v[ok]
        if not g.directed:
            u, v = np.minimum(u, v), np.maximum(u, v)
        key = u * np.int64(n) + v
        keep = []
        for i, kk in enumerate(key.tolist()):
            if kk in seen:
                continue
            seen.add(kk)
            keep.append(i)
        if keep:
            sel = np.array(keep)
            pairs.append(np.stack([u[sel], v[sel]], axis=1))
            have += len(keep)
    return np.vstack(pairs)[:count]


def reconstruction_precision(
    emb: Embedding,
    g: LocalGraph,
    ks: list[int],
    *,
    sample: int | None = None,
    seed: int = 0,
    spark: SparkSession | None = None,
) -> dict[int, float]:
    """precision@K for each K in ``ks``. ``sample``: number of candidate
    pairs to draw (None = all pairs). ``spark``: use the distributed
    scorer for the all-pairs path."""
    keys = g.edge_key_set()
    kmax = max(ks)
    if sample is None:
        if spark is not None:
            top = topk_pairs_spark(spark, emb, g, kmax)
        else:
            top = topk_pairs_numpy(emb, g, kmax)
    else:
        cand = sample_candidate_pairs(g, sample, seed)
        scores = emb.score_pairs(cand)
        order = np.argsort(-scores, kind="stable")[:kmax]
        top = cand[order]
    is_edge = np.array(
        [(u * np.int64(g.n) + v) in keys for u, v in top], dtype=bool
    )
    return precision_at_k(is_edge, ks)
