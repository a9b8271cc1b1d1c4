"""SVD via the Gram matrix: distributed A'A + driver-side eigensolve.

The distributed part — computing ``G = Aᵀ A`` with one aggregation over
closed-form product columns — is the expensive Spark stage; the tiny
``dim × dim`` eigen decomposition happens on the driver (exactly how
MLlib computes SVD for tall-skinny matrices). Singular values/vectors
are checked against ``numpy.linalg.svd`` in tests.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def gram_matrix(points: DataFrame) -> np.ndarray:
    """Aᵀ A over the ``x*`` columns, via one Spark aggregation."""
    dims = [c for c in points.columns if c.startswith("x")]
    aggs = [
        F.sum(F.col(a) * F.col(b)).alias(f"g_{i}_{j}")
        for i, a in enumerate(dims)
        for j, b in enumerate(dims)
        if j >= i
    ]
    row = points.agg(*aggs).collect()[0]
    d = len(dims)
    G = np.zeros((d, d))
    for i in range(d):
        for j in range(i, d):
            G[i, j] = G[j, i] = row[f"g_{i}_{j}"]
    return G


def singular_values(points: DataFrame) -> np.ndarray:
    """Singular values of the point matrix, descending."""
    G = gram_matrix(points)
    eig = np.linalg.eigvalsh(G)
    return np.sqrt(np.maximum(eig, 0.0))[::-1]
