"""Linear-algebra substrate: Laplacian toolbox and spectral-gap solver."""
from repro.linalg.eigen import lambda_max_local, lambda_max_spark
from repro.linalg.laplacian import exact_er, exact_er_matrix, laplacian_dense

__all__ = [
    "lambda_max_local",
    "lambda_max_spark",
    "exact_er",
    "exact_er_matrix",
    "laplacian_dense",
]
