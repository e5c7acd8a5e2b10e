"""Personalized PageRank substrate: dense numpy oracle + distributed
(pregel-style) truncated power iteration over Spark DataFrames."""
from repro.ppr.exact import ppr_dense, ppr_truncated  # noqa: F401
