"""Experiment harness, metrics, and application-level evaluations."""
from . import apps, harness, metrics

__all__ = ["apps", "harness", "metrics"]
