"""Method registry: one entry per embedding method evaluated in the
reproduction, with the capability flags the harness needs (directed-native
scoring, scale caps mirroring the paper's 7-day cutoff, category)."""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Optional

from pyspark.sql import SparkSession

from repro.baselines.factorization import arope, netmf, prone, randne, strap
from repro.baselines.neural import gae
from repro.baselines.walkers import app, deepwalk, line, verse
from repro.core.approxppr import approxppr
from repro.core.nrp import nrp
from repro.embedding import Embedding
from repro.graphs.edgelist import LocalGraph


def _nrp_embed(
    g: LocalGraph, k: int, seed: int, spark: Optional[SparkSession] = None,
    **kw,
) -> Embedding:
    backend = "spark" if spark is not None else "local"
    # lam=1 is the lite-scale analogue of the paper's lam=10: the
    # regularizer must stay small against degree-residual terms that are
    # ~2 orders of magnitude smaller on graphs 40-1000x below paper scale
    kw.setdefault("lam", 1.0)
    res = nrp(g, k, seed=seed, backend=backend, spark=spark, **kw)
    return Embedding(X=res.X, Y=res.Y, name="nrp")


def _approxppr_embed(
    g: LocalGraph, k: int, seed: int, spark: Optional[SparkSession] = None,
    **kw,
) -> Embedding:
    backend = "spark" if spark is not None else "local"
    X, Y = approxppr(
        g, max(k // 2, 1), seed=seed, backend=backend, spark=spark, **kw
    )
    return Embedding(X=X, Y=Y, name="approxppr")


@dataclass(frozen=True)
class Method:
    name: str
    fn: Callable[..., Embedding]      # (graph, k, seed, spark=None) -> Embedding
    group: str                        # paper's category
    dual: bool                        # produces forward + backward vectors
    directed_native: bool             # handles edge direction natively
    max_n: int | None = None          # scale cap (paper's 7-day analogue)
    spark_capable: bool = False       # accepts spark= for distributed phase

    def embed(
        self,
        g: LocalGraph,
        k: int,
        seed: int = 0,
        spark: Optional[SparkSession] = None,
        **kw,
    ) -> Embedding:
        if self.max_n is not None and g.n > self.max_n:
            raise ValueError(
                f"{self.name} capped at n <= {self.max_n} (got {g.n})"
            )
        if self.spark_capable:
            return self.fn(g, k, seed, spark=spark, **kw)
        return self.fn(g, k, seed=seed, **kw)


def _wrap(fn):
    # uniform (g, k, seed=...) signature for the non-core methods
    return lambda g, k, seed=0, **kw: fn(g, k, seed=seed, **kw)


METHODS: dict[str, Method] = {
    "nrp": Method("nrp", _nrp_embed, "ours", True, True, None, True),
    "approxppr": Method(
        "approxppr", _approxppr_embed, "ours", True, True, None, True
    ),
    "strap": Method("strap", _wrap(strap), "factorization", True, True, 6000),
    "arope": Method("arope", _wrap(arope), "factorization", False, False, None),
    "randne": Method("randne", _wrap(randne), "factorization", False, False, None),
    "prone": Method("prone", _wrap(prone), "factorization", False, False, None),
    "netmf": Method("netmf", _wrap(netmf), "factorization", False, False, 4000),
    # SGNS / neural caps mirror the paper's 7-day cutoff at our scale:
    # numpy SGD over walks is exactly the cost the paper's Fig. 7 punishes
    "deepwalk": Method("deepwalk", _wrap(deepwalk), "random-walk", False, False, 5000),
    "line": Method("line", _wrap(line), "random-walk", False, False, 12000),
    "app": Method("app", _wrap(app), "random-walk", True, True, 5000),
    "verse": Method("verse", _wrap(verse), "random-walk", False, False, 5000),
    "gae": Method("gae", _wrap(gae), "neural", False, False, 2500),
}


def get_method(name: str) -> Method:
    try:
        return METHODS[name]
    except KeyError:
        raise KeyError(
            f"unknown method {name!r}; available: {sorted(METHODS)}"
        ) from None
