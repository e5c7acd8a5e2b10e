"""Per-table experiment runners (DESIGN.md §6).

Each function reproduces one table/figure of the paper's evaluation: it
runs the workload, prints the table rows, and returns them as a pandas
DataFrame so jobs and benchmarks share one implementation.

Protocol notes (paper Section 5.2):
* dual-vector methods (NRP, ApproxPPR, STRAP, APP, AROPE) score (u, v) as
  forward(u) . backward(v);
* single-vector factorization methods (RandNE, ProNE, NetMF, GAE) use the
  plain inner product;
* single-vector SGNS methods (DeepWalk, LINE, VERSE) use the inner product
  on undirected graphs and the edge-features logistic regression on
  directed graphs, where the inner product cannot represent direction.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.registry import METHODS, Method, get_method
from repro.core.nrp import nrp
from repro.embedding import Embedding
from repro.experiments.datasets import (
    _EVOLVING_SPECS,
    _SPECS,
    load_dataset,
    load_evolving,
)
from repro.graphs.edgelist import LocalGraph, SparkGraph
from repro.graphs.generators import erdos_renyi, example_graph
from repro.graphs.stats import evolving_stats_row, stats_row
from repro.ppr.exact import ppr_dense
from repro.ppr.power import ppr_rows_numpy
from repro.tasks.classification import node_classification_f1
from repro.tasks.linkpred import link_prediction_auc
from repro.tasks.reconstruction import reconstruction_precision
from repro.tasks.split import LinkSplit, link_prediction_split, sample_negative_pairs

#: paper Table 1 (v7 row is the corrected value — DESIGN.md §4)
TABLE1_PAPER = {
    "v2": [0.15, 0.269, 0.188, 0.118, 0.17, 0.048, 0.029, 0.019, 0.008],
    "v4": [0.15, 0.118, 0.188, 0.269, 0.17, 0.048, 0.029, 0.019, 0.008],
    "v7": [0.036, 0.043, 0.056, 0.043, 0.093, 0.137, 0.29, 0.187, 0.12],
    "v9": [0.02, 0.024, 0.031, 0.024, 0.056, 0.083, 0.168, 0.311, 0.282],
}


def _print(df: pd.DataFrame, title: str) -> pd.DataFrame:
    print(f"\n== {title} ==")
    print(df.to_string(index=False))
    return df


def eligible(method: Method, g: LocalGraph) -> bool:
    return method.max_n is None or g.n <= method.max_n


def protocol_for(method: Method, g: LocalGraph) -> str:
    if method.dual:
        return "inner"
    if g.directed and method.group == "random-walk":
        return "edge_features"
    return "inner"


# ---------------------------------------------------------------- Table 1
def table1_ppr(spark: SparkSession | None = None) -> pd.DataFrame:
    """Reproduce paper Table 1: PPR values on the Fig. 1 graph, exact oracle
    plus (optionally) the distributed power iteration."""
    g = example_graph()
    pi = ppr_dense(g, alpha=0.15)
    sources = {"v2": 1, "v4": 3, "v7": 6, "v9": 8}
    spark_rows = None
    if spark is not None:
        sg = SparkGraph(spark, g)
        spark_rows = ppr_rows_numpy(sg, list(sources.values()), alpha=0.15, iters=60)
        sg.unpersist()
    rows = []
    for i, (label, src) in enumerate(sources.items()):
        for j in range(9):
            row = {
                "source": label,
                "target": f"v{j + 1}",
                "paper": TABLE1_PAPER[label][j],
                "exact": round(float(pi[src, j]), 3),
            }
            if spark_rows is not None:
                row["spark"] = round(float(spark_rows[i, j]), 3)
            rows.append(row)
    return _print(pd.DataFrame(rows), "Table 1: PPR on the Fig.1 graph (alpha=0.15)")


# ------------------------------------------------------------- Tables 3 & 4
def datasets_table() -> pd.DataFrame:
    rows = []
    for name in _SPECS:
        b = load_dataset(name)
        r = stats_row(
            b.graph,
            None if b.labels is None else len(np.unique(b.labels)),
        )
        r["paper_dataset"] = b.paper_name
        r["paper_n"] = b.paper_n
        r["paper_m"] = b.paper_m
        rows.append(r)
    return _print(pd.DataFrame(rows), "Table 3: datasets (lite stand-ins)")


def evolving_datasets_table() -> pd.DataFrame:
    rows = []
    for name in _EVOLVING_SPECS:
        g_old, new, paper = load_evolving(name)
        r = evolving_stats_row(g_old, new, name)
        r["paper_dataset"] = paper
        rows.append(r)
    return _print(pd.DataFrame(rows), "Table 4: evolving datasets (lite)")


# ------------------------------------------------------------- Fig 4 (LP)
def _embed_timed(
    method: Method,
    g: LocalGraph,
    k: int,
    seed: int,
    spark: SparkSession | None,
) -> tuple[Embedding, float]:
    t0 = time.perf_counter()
    emb = method.embed(g, k, seed=seed, spark=spark)
    return emb, time.perf_counter() - t0


def link_prediction_table(
    datasets: list[str],
    methods: list[str],
    ks: list[int],
    *,
    seed: int = 0,
    spark: SparkSession | None = None,
    spark_methods: tuple[str, ...] = (),
) -> pd.DataFrame:
    """Fig. 4: link-prediction AUC vs embedding dimensionality k."""
    rows = []
    for ds in datasets:
        b = load_dataset(ds)
        split = link_prediction_split(b.graph, frac=0.3, seed=seed)
        for name in methods:
            m = get_method(name)
            if not eligible(m, b.graph):
                rows.append(
                    {"dataset": ds, "method": name, "k": None, "auc": None,
                     "note": "excluded (scale cap, cf. paper's 7-day cutoff)"}
                )
                continue
            for k in ks:
                sp = spark if name in spark_methods else None
                emb, _ = _embed_timed(m, split.train, k, seed, sp)
                auc = link_prediction_auc(
                    emb, split, protocol=protocol_for(m, b.graph), seed=seed
                )
                rows.append(
                    {"dataset": ds, "method": name, "k": k,
                     "auc": round(auc, 4), "note": ""}
                )
    return _print(pd.DataFrame(rows), "Fig 4: link prediction AUC")


# ------------------------------------------------------------- Fig 5 (GR)
def reconstruction_table(
    datasets: list[str],
    methods: list[str],
    ks_eval: list[int],
    *,
    k: int = 32,
    sample_above_n: int = 4000,
    seed: int = 0,
    spark: SparkSession | None = None,
) -> pd.DataFrame:
    """Fig. 5: graph reconstruction precision@K (all pairs on small graphs,
    a 1%-of-pairs sample on larger ones — the paper's protocol)."""
    rows = []
    for ds in datasets:
        b = load_dataset(ds)
        n = b.graph.n
        sample = None
        if n > sample_above_n:
            sample = min(int(0.01 * n * (n - 1) / 2), 2_000_000)
        for name in methods:
            m = get_method(name)
            if not eligible(m, b.graph):
                rows.append({"dataset": ds, "method": name, "K": None,
                             "precision": None, "note": "excluded (scale cap)"})
                continue
            emb, _ = _embed_timed(m, b.graph, k, seed, None)
            prec = reconstruction_precision(
                emb, b.graph, ks_eval, sample=sample, seed=seed, spark=spark
            )
            for K, p in prec.items():
                rows.append({"dataset": ds, "method": name, "K": K,
                             "precision": round(p, 4), "note": ""})
    return _print(pd.DataFrame(rows), "Fig 5: graph reconstruction precision@K")


# ------------------------------------------------------------- Fig 6 (NC)
def classification_table(
    datasets: list[str],
    methods: list[str],
    ratios: list[float],
    *,
    k: int = 32,
    seed: int = 0,
) -> pd.DataFrame:
    """Fig. 6: node classification micro/macro F1 vs train ratio."""
    rows = []
    for ds in datasets:
        b = load_dataset(ds)
        if b.labels is None:
            continue
        for name in methods:
            m = get_method(name)
            if not eligible(m, b.graph):
                rows.append({"dataset": ds, "method": name, "ratio": None,
                             "micro_f1": None, "macro_f1": None,
                             "note": "excluded (scale cap)"})
                continue
            emb, _ = _embed_timed(m, b.graph, k, seed, None)
            for r in ratios:
                micro, macro = node_classification_f1(
                    emb, b.labels, train_ratio=r, seed=seed
                )
                rows.append({"dataset": ds, "method": name, "ratio": r,
                             "micro_f1": round(micro, 4),
                             "macro_f1": round(macro, 4), "note": ""})
    return _print(pd.DataFrame(rows), "Fig 6: node classification F1")


# ------------------------------------------------------------- Fig 7 (time)
def efficiency_table(
    datasets: list[str],
    methods: list[str],
    ks: list[int],
    *,
    seed: int = 0,
    spark: SparkSession | None = None,
    spark_methods: tuple[str, ...] = (),
) -> pd.DataFrame:
    """Fig. 7: embedding construction time vs k (excluded methods mirror the
    paper's 7-day cutoff via scale caps)."""
    rows = []
    for ds in datasets:
        b = load_dataset(ds)
        for name in methods:
            m = get_method(name)
            if not eligible(m, b.graph):
                rows.append({"dataset": ds, "method": name, "k": None,
                             "seconds": None, "note": "excluded (scale cap)"})
                continue
            for k in ks:
                sp = spark if name in spark_methods else None
                _, secs = _embed_timed(m, b.graph, k, seed, sp)
                rows.append({"dataset": ds, "method": name, "k": k,
                             "seconds": round(secs, 3), "note": ""})
    return _print(pd.DataFrame(rows), "Fig 7: embedding construction time (s)")


# ------------------------------------------------------------- Fig 8 / 11
def param_sweep_table(
    dataset: str,
    *,
    alphas=(0.1, 0.15, 0.3, 0.5, 0.7, 0.9),
    epss=(0.1, 0.2, 0.5, 0.9),
    l1s=(1, 5, 10, 20, 30),
    l2s=(0, 2, 5, 10, 20),
    k: int = 32,
    lam: float = 1.0,
    seed: int = 0,
    measure_time: bool = False,
) -> pd.DataFrame:
    """Fig. 8 (AUC) / Fig. 11 (runtime) parameter analysis for NRP: vary
    one of alpha, eps, l1, l2 with the others at paper defaults (lam=1 is
    the lite-scale analogue of the paper's lam=10 — see registry)."""
    b = load_dataset(dataset)
    split = link_prediction_split(b.graph, frac=0.3, seed=seed)
    defaults = dict(alpha=0.15, eps=0.2, l1=20, l2=10, lam=lam)
    grids = {"alpha": alphas, "eps": epss, "l1": l1s, "l2": l2s}
    rows = []
    for pname, grid in grids.items():
        for val in grid:
            kw = dict(defaults)
            kw[pname] = val
            t0 = time.perf_counter()
            res = nrp(split.train, k, seed=seed, **kw)
            secs = time.perf_counter() - t0
            emb = Embedding(X=res.X, Y=res.Y, name="nrp")
            auc = link_prediction_auc(emb, split)
            row = {"dataset": dataset, "param": pname, "value": val,
                   "auc": round(auc, 4)}
            if measure_time:
                row["seconds"] = round(secs, 3)
            rows.append(row)
    title = "Fig 11: NRP runtime vs parameters" if measure_time else \
        "Fig 8: NRP link-prediction AUC vs parameters"
    return _print(pd.DataFrame(rows), title)


# ------------------------------------------------------------- Fig 9 (evolving)
def evolving_table(
    datasets: list[str],
    methods: list[str],
    *,
    k: int = 32,
    seed: int = 0,
) -> pd.DataFrame:
    """Appendix Fig. 9: predict real future edges from the old snapshot."""
    rows = []
    for ds in datasets:
        g_old, new_edges, paper = load_evolving(ds)
        rng = np.random.default_rng(seed)
        # negatives: pairs absent from both snapshots
        union = LocalGraph(
            np.vstack([g_old.edges, new_edges]), g_old.n, g_old.directed,
            name=ds + "_union",
        )
        neg = sample_negative_pairs(union, len(new_edges), rng)
        pairs = np.vstack([new_edges, neg])
        labels = np.concatenate(
            [np.ones(len(new_edges), dtype=np.int64),
             np.zeros(len(neg), dtype=np.int64)]
        )
        split = LinkSplit(train=g_old, test_pairs=pairs, test_labels=labels)
        for name in methods:
            m = get_method(name)
            if not eligible(m, g_old):
                rows.append({"dataset": ds, "method": name, "auc": None,
                             "note": "excluded (scale cap)"})
                continue
            emb, _ = _embed_timed(m, g_old, k, seed, None)
            auc = link_prediction_auc(
                emb, split, protocol=protocol_for(m, g_old), seed=seed
            )
            rows.append({"dataset": ds, "method": name,
                         "auc": round(auc, 4), "note": ""})
    return _print(pd.DataFrame(rows), "Fig 9: link prediction on evolving graphs")


# ------------------------------------------------------------- Fig 10 (scal.)
def scalability_table(
    spark: SparkSession | None,
    *,
    ns=(20_000, 40_000, 60_000, 80_000, 100_000),
    ms=(200_000, 400_000, 600_000, 800_000, 1_000_000),
    fixed_n: int = 100_000,
    fixed_m: int = 1_000_000,
    k: int = 32,
    l1: int = 20,
    l2: int = 10,
    seed: int = 0,
    backend: str = "local",
) -> pd.DataFrame:
    """Appendix Fig. 10: NRP runtime on Erdos-Renyi graphs, varying n at
    fixed m and m at fixed n (paper used n up to 1e6, m up to 1e8; we scale
    both down 10x — DESIGN.md §3)."""
    rows = []
    for n in ns:
        g = erdos_renyi(n, fixed_m, seed=seed, name=f"er_n{n}")
        t0 = time.perf_counter()
        nrp(g, k, l1=l1, l2=l2, seed=seed, backend=backend, spark=spark)
        rows.append({"vary": "n", "n": n, "m": fixed_m,
                     "seconds": round(time.perf_counter() - t0, 2)})
    for m in ms:
        g = erdos_renyi(fixed_n, m, seed=seed, name=f"er_m{m}")
        t0 = time.perf_counter()
        nrp(g, k, l1=l1, l2=l2, seed=seed, backend=backend, spark=spark)
        rows.append({"vary": "m", "n": fixed_n, "m": m,
                     "seconds": round(time.perf_counter() - t0, 2)})
    return _print(
        pd.DataFrame(rows),
        f"Fig 10: NRP scalability on Erdos-Renyi graphs ({backend} backend)",
    )
