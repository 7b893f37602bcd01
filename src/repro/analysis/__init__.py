"""Evaluation metrics (§V-C, §V-F) and the paper's error theory (§IV)."""
from repro.analysis.metrics import (
    detection_metrics,
    estimates_at_checkpoints,
    rse_by_bucket,
    rse_exact,
    super_spreaders,
)
from repro.analysis import theory

__all__ = [
    "rse_exact",
    "rse_by_bucket",
    "super_spreaders",
    "detection_metrics",
    "estimates_at_checkpoints",
    "theory",
]
