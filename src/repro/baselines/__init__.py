"""Baseline imputation methods (Table II) and the method registry.

Every method maps ``(spark, r, incomplete, F, A_x, **params)`` to a
DataFrame ``(row_id, imputed)``. ``METHODS`` is the ordered registry
the Table V/VI/VII harnesses iterate over (IIM first, like the paper's
column order); ``requires_multivariate`` marks methods the paper
reports as "-" on the 2-attribute SN dataset.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

from ..core.iim import iim_impute
from .boosting import xgb_impute
from .cluster import gmm_impute, ifc_impute
from .matrix import ills_impute, svd_impute
from .regression import (
    blr_impute,
    eracer_impute,
    glr_impute,
    loess_impute,
    pmm_impute,
)
from .simple import knn_impute, knne_impute, mean_impute


@dataclass(frozen=True)
class Method:
    name: str
    fn: Callable
    requires_multivariate: bool = False  # "-" on 2-attribute datasets


METHODS: dict[str, Method] = {
    m.name: m
    for m in [
        Method("IIM", iim_impute),
        Method("Mean", mean_impute),
        Method("kNN", knn_impute),
        Method("kNNE", knne_impute),
        Method("IFC", ifc_impute),
        Method("GMM", gmm_impute),
        Method("SVD", svd_impute, requires_multivariate=True),
        Method("ILLS", ills_impute, requires_multivariate=True),
        Method("GLR", glr_impute),
        Method("LOESS", loess_impute),
        Method("BLR", blr_impute),
        Method("ERACER", eracer_impute),
        Method("PMM", pmm_impute),
        Method("XGB", xgb_impute, requires_multivariate=True),
    ]
}

__all__ = [
    "METHODS",
    "Method",
    "blr_impute",
    "eracer_impute",
    "glr_impute",
    "gmm_impute",
    "ifc_impute",
    "iim_impute",
    "ills_impute",
    "knn_impute",
    "knne_impute",
    "loess_impute",
    "mean_impute",
    "pmm_impute",
    "svd_impute",
    "xgb_impute",
]
