"""Dense PPR oracle (numpy; small graphs only).

Definitions from the paper, Section 3.1:

* Eq. (1): ``Pi = sum over i>=0 of alpha (1-alpha)^i P^i`` — full PPR.
* Eq. (3): ``Pi' = sum over i=1..l1 of alpha (1-alpha)^i P^i`` — the
  truncated, diagonal-free series that ApproxPPR factorizes.

Dangling nodes (zero out-degree) get a zero transition row, so their walk
mass vanishes rather than teleporting — matching the paper's random-walk
semantics where a walk that cannot move simply never terminates anywhere.
"""
from __future__ import annotations

import numpy as np

from repro.graphs.edgelist import LocalGraph


def ppr_dense(
    g: LocalGraph, alpha: float = 0.15, iters: int = 300
) -> np.ndarray:
    """Full PPR matrix Pi (Eq. 1), geometric series summed to ``iters``."""
    P = g.transition()
    n = g.n
    pi = np.zeros((n, n))
    walk = np.eye(n)
    for i in range(iters):
        pi += alpha * (1.0 - alpha) ** i * walk
        if (1.0 - alpha) ** i < 1e-14:
            break
        walk = walk @ P
    return pi


def ppr_truncated(
    g: LocalGraph, alpha: float = 0.15, l1: int = 20
) -> np.ndarray:
    """Truncated PPR matrix Pi' (Eq. 3): orders 1..l1, no diagonal i=0 term."""
    P = g.transition()
    n = g.n
    pi = np.zeros((n, n))
    walk = np.eye(n)
    for i in range(1, l1 + 1):
        walk = walk @ P
        pi += alpha * (1.0 - alpha) ** i * walk
    return pi
