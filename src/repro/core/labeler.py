"""Simulated human labeler: answers duplicate/non-duplicate from the
gold DUPS list, exactly how AL papers (this one included) evaluate —
the "user" of Algorithm 1 line 26."""
from __future__ import annotations

import pandas as pd


def label_pairs(pairs: pd.DataFrame, dup_set: set) -> pd.DataFrame:
    """Attach gold labels to (rid_r, rid_s) pairs."""
    out = pairs[["rid_r", "rid_s"]].copy()
    out["label"] = [
        1 if (r, s) in dup_set else 0 for r, s in zip(out.rid_r, out.rid_s)
    ]
    return out
