"""Evaluation harness: cell-level repair metrics and the paper's tables."""
from repro.evalharness.metrics import RepairMetrics, cells, repair_metrics

__all__ = ["RepairMetrics", "cells", "repair_metrics"]
