"""Randomized block-Krylov SVD (BKSVD, Musco & Musco NIPS'15).

Used by ApproxPPR (paper Algorithm 1, line 1) to factorize the adjacency
matrix A ~= U S V^T with a (1+eps) spectral-norm guarantee. The matrix is
touched only through matvecs, so the same algorithm runs on two backends:

* :func:`bksvd_local`  — numpy matvec callables (reference oracle);
* :func:`bksvd_spark`  — arcs as a Spark DataFrame, Krylov blocks as
  :class:`~repro.linalg.longmat.LongMatrix`; every A-product is a
  join+groupBy superstep, all small (k x k) algebra stays on the driver.

Algorithm (square A, n x n): draw Gaussian Omega (n x b); build the Krylov
block K = [A Om, (A A^T) A Om, ..., (A A^T)^q A Om]; orthonormalize to Q;
Rayleigh-Ritz on A A^T restricted to span(Q) gives U; a final small SVD of
U^T A gives (S, V) and rotates U.
"""
from __future__ import annotations

from typing import Callable

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.linalg.longmat import LongMatrix


def default_q(n: int, eps: float, k: int) -> int:
    """Paper: q = Theta(log n / sqrt(eps)); clamp so the Krylov block stays
    thin relative to n."""
    q = int(np.ceil(np.log(max(n, 2)) / np.sqrt(eps) / 4.0))
    q = int(np.clip(q, 2, 8))
    while k * (q + 1) > max(n, k) and q > 0:
        q -= 1
    return max(q, 1)


def _whiten(gram: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Orthonormalization weights from a Gram matrix: returns (W, keep_mask)
    with Q = K @ W orthonormal (rank-revealing; tiny directions dropped)."""
    lam, E = np.linalg.eigh((gram + gram.T) / 2.0)
    tol = max(lam.max(), 0.0) * 1e-10 + 1e-30
    keep = lam > tol
    W = E[:, keep] / np.sqrt(lam[keep])
    return W, keep


def _ritz(QtAAtQ: np.ndarray, k: int) -> np.ndarray:
    """Top-k Ritz vectors of a small symmetric matrix (columns)."""
    lam, E = np.linalg.eigh((QtAAtQ + QtAAtQ.T) / 2.0)
    return E[:, ::-1][:, :k]


def _final_svd(RtR: np.ndarray, k: int):
    """From R = A^T U (n x k): SVD of B = U^T A via the small Gram RtR.

    Returns (W2, sig, Vmul) with final U = U @ W2, V = R @ Vmul.
    """
    lam, W2 = np.linalg.eigh((RtR + RtR.T) / 2.0)
    lam, W2 = lam[::-1][:k], W2[:, ::-1][:, :k]
    sig = np.sqrt(np.clip(lam, 0.0, None))
    inv = np.where(sig > 1e-12, 1.0 / np.maximum(sig, 1e-300), 0.0)
    return W2, sig, W2 * inv[None, :]


def bksvd_local(
    mv: Callable[[np.ndarray], np.ndarray],
    rmv: Callable[[np.ndarray], np.ndarray],
    n: int,
    k: int,
    *,
    eps: float = 0.2,
    q: int | None = None,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Reference BKSVD. ``mv(X) = A @ X``, ``rmv(X) = A.T @ X``; returns
    (U, sig, V) with U, V of shape (n, k), sig descending."""
    q = default_q(n, eps, k) if q is None else q
    rng = np.random.default_rng(seed)
    omega = rng.standard_normal((n, k))

    def _normalize(b: np.ndarray) -> np.ndarray:
        # scale per block so the Krylov Gram stays well-conditioned across
        # q powers of A A^T (the span is unchanged)
        s = np.linalg.norm(b)
        return b / s if s > 0 else b

    blocks = [_normalize(mv(omega))]
    for _ in range(q):
        blocks.append(_normalize(mv(rmv(blocks[-1]))))
    K = np.hstack(blocks)
    W, _ = _whiten(K.T @ K)
    Q = K @ W
    T = rmv(Q)  # A^T Q
    Wr = _ritz(T.T @ T, k)
    U = Q @ Wr
    R = rmv(U)  # A^T U
    W2, sig, Vmul = _final_svd(R.T @ R, k)
    return U @ W2, sig, R @ Vmul


def bksvd_spark(
    spark: SparkSession,
    arcs: DataFrame,
    n: int,
    k: int,
    *,
    eps: float = 0.2,
    q: int | None = None,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Distributed BKSVD over an arc DataFrame (src, dst). A[u, v] = 1 iff
    arc (u, v) exists. Embedding-sized outputs are collected to numpy."""
    q = default_q(n, eps, k) if q is None else q
    rng = np.random.default_rng(seed)
    arcs_t = arcs.select(
        F.col("dst").alias("src"), F.col("src").alias("dst")
    ).cache()

    def mv(x: LongMatrix) -> LongMatrix:
        return x.spmm(arcs, n).checkpoint()

    def rmv(x: LongMatrix) -> LongMatrix:
        return x.spmm(arcs_t, n).checkpoint()

    def _normalize(b: LongMatrix) -> LongMatrix:
        # per-block scaling, as in the local backend, to keep the Krylov
        # Gram well-conditioned; the Frobenius norm is a tiny Gram trace
        s = float(np.sqrt(max(np.trace(b.gram(b)), 0.0)))
        return b.scale(1.0 / s).checkpoint() if s > 0 else b

    omega = LongMatrix.from_numpy(spark, rng.standard_normal((n, k)))
    block = _normalize(mv(omega))
    K = block
    for _ in range(q):
        block = _normalize(mv(rmv(block)))
        K = K.hstack(block)
    K = K.checkpoint()
    W, _ = _whiten(K.gram(K))  # Gram computed distributed
    Q = K.mm_small(spark, W).checkpoint()
    T = rmv(Q)
    Wr = _ritz(T.gram(T), k)
    U = Q.mm_small(spark, Wr).checkpoint()
    R = rmv(U)
    W2, sig, Vmul = _final_svd(R.gram(R), k)
    U_np = U.to_numpy() @ W2
    V_np = R.to_numpy() @ Vmul
    arcs_t.unpersist()
    return U_np, sig, V_np
