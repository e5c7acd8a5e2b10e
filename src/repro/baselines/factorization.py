"""Factorization-based baselines: AROPE, RandNE, NetMF, ProNE, STRAP.

Each returns an :class:`~repro.embedding.Embedding`. The undirected-only
methods (AROPE, RandNE, NetMF, ProNE) symmetrize a directed input, exactly
as the paper does when reporting them on directed graphs.
"""
from __future__ import annotations

import numpy as np

from repro.embedding import Embedding
from repro.graphs.edgelist import LocalGraph
from repro.linalg.bksvd import bksvd_local
from repro.ppr.exact import ppr_dense


def _symmetrized(g: LocalGraph) -> LocalGraph:
    if not g.directed:
        return g
    return LocalGraph.from_edges(g.edges, g.n, directed=False, name=g.name + "_sym")


def arope(
    g: LocalGraph,
    k: int,
    *,
    order: int = 3,
    beta: float = 0.1,
    seed: int = 0,
) -> Embedding:
    """AROPE (Zhang et al., KDD'18): eigen-decompose the (symmetrized)
    adjacency once, then reweight eigenvalues with the arbitrary-order
    polynomial F(lam) = sum_i beta^{i-1} lam^i to preserve
    S = sum_i w_i A^i without materializing S."""
    gs = _symmetrized(g)
    U, _, _ = bksvd_local(gs.spmv, gs.spmv_t, gs.n, k, q=6, seed=seed)
    # Ritz values give signed eigenvalues (bksvd's singular values lose sign)
    lam = np.einsum("ij,ij->j", U, gs.spmv(U))
    F = sum(beta ** (i - 1) * lam**i for i in range(1, order + 1))
    # single content vector U sqrt(|F|), scored by plain inner product —
    # the AROPE/NRP papers' protocol for this method
    X = U * np.sqrt(np.abs(F))[None, :]
    return Embedding(X=X, Y=None, name="arope")


def randne(
    g: LocalGraph,
    k: int,
    *,
    q: int = 3,
    weights: tuple[float, ...] = (1.0, 1e2, 1e4, 1e5),
    seed: int = 0,
) -> Embedding:
    """RandNE (Zhang et al., ICDM'18): iterated Gaussian random projection
    U_i = P U_{i-1}; embedding = sum_i a_i U_i."""
    gs = _symmetrized(g)
    rng = np.random.default_rng(seed)
    U0 = rng.standard_normal((gs.n, k)) / np.sqrt(k)
    # orthogonalize the projection block (RandNE-II)
    Q, _ = np.linalg.qr(U0)
    blocks = [Q]
    for _ in range(q):
        blocks.append(gs.pmv(blocks[-1]))
    X = sum(w * b for w, b in zip(weights, blocks))
    return Embedding(X=X, Y=None, name="randne")


def netmf(
    g: LocalGraph,
    k: int,
    *,
    T: int = 10,
    b: float = 1.0,
    seed: int = 0,
    max_n: int = 4000,
) -> Embedding:
    """NetMF (Qiu et al., WSDM'18): factorize the closed-form DeepWalk
    matrix M = log max(1, vol/(bT) (sum_{r<=T} P^r) D^-1). Materializes a
    dense n x n matrix — scale-capped exactly like the paper's runs."""
    if g.n > max_n:
        raise ValueError(f"netmf is dense O(n^2); capped at n <= {max_n}")
    gs = _symmetrized(g)
    P = gs.transition()
    d = np.maximum(gs.d_out, 1.0)
    vol = gs.d_out.sum()
    acc = np.zeros_like(P)
    walk = np.eye(gs.n)
    for _ in range(T):
        walk = walk @ P
        acc += walk
    M = np.log(np.maximum(vol / (b * T) * acc / d[None, :], 1.0))
    U, s, V = bksvd_local(
        lambda x: M @ x, lambda x: M.T @ x, gs.n, k, q=6, seed=seed
    )
    return Embedding(X=U * np.sqrt(s)[None, :], Y=None, name="netmf")


def prone(
    g: LocalGraph,
    k: int,
    *,
    order: int = 10,
    mu: float = 0.2,
    theta: float = 0.5,
    seed: int = 0,
) -> Embedding:
    """ProNE (Zhang et al., IJCAI'19): truncated SVD of the normalized
    adjacency for the initial embedding, then the paper's modulated
    Gaussian band-pass spectral propagation, applied via a Chebyshev
    expansion of g(lam) = exp(-theta ((lam - mu)^2 - 1) / 2) on the
    normalized Laplacian (coefficients by Gauss-Chebyshev quadrature —
    the band-pass is tuned for classification, which is why ProNE trails
    on link prediction in the paper)."""
    gs = _symmetrized(g)
    d = np.maximum(gs.d_out, 1.0)
    dinv_sqrt = 1.0 / np.sqrt(d)

    def a_sym(x):
        return dinv_sqrt[:, None] * gs.spmv(dinv_sqrt[:, None] * x)

    U, s, V = bksvd_local(a_sym, a_sym, gs.n, k, q=6, seed=seed)
    X = U * np.sqrt(s)[None, :]
    # Laplacian L = I - A_sym has spectrum in [0, 2]; rescale to
    # Lhat = L - I (spectrum [-1, 1]) for the Chebyshev recurrence
    def lhat(x):
        return -a_sym(x)

    def g_kernel(lam_hat):
        lam = lam_hat + 1.0  # back to [0, 2]
        return np.exp(-theta * ((lam - mu) ** 2 - 1.0) / 2.0)

    # Gauss-Chebyshev quadrature for the expansion coefficients
    nq = 256
    xq = np.cos((np.arange(nq) + 0.5) * np.pi / nq)
    gq = g_kernel(xq)
    coef = [
        (2.0 - (t == 0)) / nq
        * float(np.sum(gq * np.cos(t * (np.arange(nq) + 0.5) * np.pi / nq)))
        for t in range(order + 1)
    ]
    t_prev, t_cur = X, lhat(X)
    acc = coef[0] * t_prev + coef[1] * t_cur
    for t in range(2, order + 1):
        t_prev, t_cur = t_cur, 2.0 * lhat(t_cur) - t_prev
        acc += coef[t] * t_cur
    # final enhancement: one propagation through D^-1 A (ProNE Eq. 10)
    X_out = gs.pmv(acc)
    return Embedding(X=X_out, Y=None, name="prone")


def strap(
    g: LocalGraph,
    k: int,
    *,
    alpha: float = 0.15,
    delta: float = 1e-4,
    iters: int = 20,
    seed: int = 0,
    max_n: int = 6000,
) -> Embedding:
    """STRAP (Yin & Wei, KDD'19): factorize the transpose proximity matrix
    M = Pi + Pi~^T, where Pi / Pi~ are delta-thresholded PPR matrices of G
    and its transpose (entries <= delta/2 dropped, as in the paper)."""
    if g.n > max_n:
        raise ValueError(f"strap materializes thresholded PPR; n <= {max_n}")
    k2 = max(k // 2, 1)
    pi = ppr_dense(g, alpha, iters=iters)
    pi[pi <= delta / 2.0] = 0.0
    if g.directed:
        pi_t = ppr_dense(g.transpose(), alpha, iters=iters)
        pi_t[pi_t <= delta / 2.0] = 0.0
    else:
        pi_t = pi
    M = pi + pi_t.T
    U, s, V = bksvd_local(
        lambda x: M @ x, lambda x: M.T @ x, g.n, k2, q=6, seed=seed
    )
    root = np.sqrt(s)[None, :]
    return Embedding(X=U * root, Y=V * root, name="strap")
