"""Reproduction of "Learning Individual Models for Imputation" (ICDE'19).

Subpackages:
  core      — IIM: individual-model learning, adaptive selection, imputation
  baselines — the 13 comparison methods of Table II
  ml        — from-scratch ML substrates (kmeans, FCM, GMM, SVD, GBT, ibk)
  datasets  — synthetic equivalents of the 9 paper datasets + masking
  eval      — metrics and the Table V/VI/VII harnesses
"""

__version__ = "0.1.0"
