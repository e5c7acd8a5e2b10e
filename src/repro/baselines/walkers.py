"""Random-walk SGNS baselines: DeepWalk, LINE, APP, VERSE."""
from __future__ import annotations

import numpy as np

from repro.baselines.sgns import (
    geometric_stop_pairs,
    random_walks,
    sgns_train,
    window_pairs,
)
from repro.embedding import Embedding
from repro.graphs.edgelist import LocalGraph


def deepwalk(
    g: LocalGraph,
    k: int,
    *,
    walks_per_node: int = 8,
    walk_len: int = 30,
    window: int = 5,
    epochs: int = 3,
    seed: int = 0,
) -> Embedding:
    """DeepWalk (Perozzi et al., KDD'14): truncated random walks + SGNS,
    single vector per node."""
    rng = np.random.default_rng(seed)
    starts = np.repeat(np.arange(g.n), walks_per_node)
    walks = random_walks(g, rng.permutation(starts), walk_len, rng)
    pairs = window_pairs(walks, window)
    W, _ = sgns_train(pairs, g.n, k, epochs=epochs, seed=seed)
    return Embedding(X=W, Y=None, name="deepwalk")


def line(
    g: LocalGraph,
    k: int,
    *,
    samples_per_edge: int = 20,
    epochs: int = 5,
    seed: int = 0,
) -> Embedding:
    """LINE second-order (Tang et al., WWW'15): SGNS over direct arcs with
    separate context vectors; the source matrix is the embedding."""
    arcs = g.arcs
    pairs = np.tile(arcs, (samples_per_edge, 1))
    W, _ = sgns_train(pairs, g.n, k, epochs=epochs, seed=seed)
    return Embedding(X=W, Y=None, name="line")


def app(
    g: LocalGraph,
    k: int,
    *,
    walks_per_node: int = 200,
    alpha: float = 0.15,
    max_len: int = 20,
    epochs: int = 10,
    seed: int = 0,
) -> Embedding:
    """APP (Zhou et al., AAAI'17): PPR-sampled (geometric-stop) pairs with
    asymmetric source/context vectors — forward/backward like NRP, but
    learned by SGD and without reweighting."""
    k2 = max(k // 2, 1)
    rng = np.random.default_rng(seed)
    pairs = geometric_stop_pairs(
        g, walks_per_node=walks_per_node, alpha=alpha, max_len=max_len, rng=rng
    )
    W, C = sgns_train(pairs, g.n, k2, epochs=epochs, seed=seed)
    return Embedding(X=W, Y=C, name="app")


def verse(
    g: LocalGraph,
    k: int,
    *,
    walks_per_node: int = 200,
    alpha: float = 0.15,
    max_len: int = 20,
    epochs: int = 10,
    seed: int = 0,
) -> Embedding:
    """VERSE (Tsitsulin et al., WWW'18): PPR-similarity SGNS with a single
    tied embedding matrix — cannot represent edge direction (the paper's
    explanation for its directed-graph weakness)."""
    rng = np.random.default_rng(seed)
    pairs = geometric_stop_pairs(
        g, walks_per_node=walks_per_node, alpha=alpha, max_len=max_len, rng=rng
    )
    W, _ = sgns_train(pairs, g.n, k, epochs=epochs, tie=True, seed=seed)
    return Embedding(X=W, Y=None, name="verse")
