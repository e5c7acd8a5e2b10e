"""Distributed linear algebra over Spark DataFrames (long-format matrices,
randomized block-Krylov SVD) plus numpy reference backends."""
from repro.linalg.longmat import LongMatrix  # noqa: F401
