"""Single-node ML substrates re-implemented from scratch.

These replace the external tools the paper relies on (Weka kmeans/ibk,
R mice, R xgboost, the reference SVDimpute package), since the
container is offline. Each runs inside Spark python workers or on the
driver over collected (small) relations.
"""
from .fuzzy import FuzzyCMeans
from .gbt import GBTRegressor
from .gmm import GaussianMixture
from .kmeans import KMeans
from .knn_classifier import IBk
from .svd_impute import SVDImputer

__all__ = [
    "FuzzyCMeans",
    "GBTRegressor",
    "GaussianMixture",
    "KMeans",
    "IBk",
    "SVDImputer",
]
