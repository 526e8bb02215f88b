"""Cell-level detection metrics: precision, recall, F1 (paper §IV-A).

A cell is a true positive when the method flags it and the dirty value
differs from ground truth. Metrics follow the paper's definitions exactly;
``prf`` aligns the prediction mask with the dataset's error mask by
row index and attribute name.
"""
from __future__ import annotations

import pandas as pd


def prf(pred_mask: pd.DataFrame, truth_mask: pd.DataFrame) -> dict[str, float]:
    """Precision / recall / F1 of a boolean detection mask vs ground truth."""
    cols = [c for c in truth_mask.columns if c in pred_mask.columns]
    pred = pred_mask[cols].to_numpy(dtype=bool)
    truth = truth_mask[cols].to_numpy(dtype=bool)
    if pred.shape != truth.shape:
        raise ValueError(f"mask shape mismatch: {pred.shape} vs {truth.shape}")
    tp = int((pred & truth).sum())
    fp = int((pred & ~truth).sum())
    fn = int((~pred & truth).sum())
    prec = tp / (tp + fp) if tp + fp else 0.0
    rec = tp / (tp + fn) if tp + fn else 0.0
    f1 = 2 * prec * rec / (prec + rec) if prec + rec else 0.0
    return {"prec": prec, "rec": rec, "f1": f1, "tp": tp, "fp": fp, "fn": fn}
