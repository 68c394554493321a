"""Assumption statistics behind the Table 1 / Section 3.4 reproduction.

The paper claims about 31% of GitHub log datasets violate
RecordBreaker's Boundary and Tokenization assumptions while DATAMARAN's
Coverage-Threshold assumption holds for the structured ones.  We
measure, on a rendered corpus, how many datasets violate each assumption
by construction (ground truth) and empirically (whether each record type
reaches alpha% coverage).
"""
from __future__ import annotations

import pandas as pd

from ..loggen.spec import DatasetSpec, render


def assumption_stats(specs: list, alpha: float = 10.0) -> pd.DataFrame:
    rows = []
    for spec in specs:
        text, truth = render(spec)
        multiline = any(t.span > 1 for t in spec.types)
        dirty = any(t.is_dirty for t in spec.types)
        cov_ok = True
        for tid in range(len(spec.types)):
            cov = sum(
                r.end - r.start for r in truth.records if r.type_id == tid
            )
            if cov < alpha / 100.0 * len(text):
                cov_ok = False
        rows.append(
            {
                "name": spec.name,
                "label": spec.label,
                "violates_boundary": multiline,  # records not single-line
                "violates_tokenization": dirty,  # specials inside fields
                "violates_rb": multiline or dirty,
                "coverage_ok": cov_ok and bool(spec.types),
                "structured": bool(spec.types),
            }
        )
    return pd.DataFrame(rows)


def assumption_table(df: pd.DataFrame) -> pd.DataFrame:
    """The Table 1 comparison, measured: % of structured datasets whose
    extraction is admissible under each system's assumptions."""
    s = df[df["structured"]]
    return pd.DataFrame(
        [
            {
                "assumption": "Boundary (RecordBreaker)",
                "violated_pct": 100.0 * s["violates_boundary"].mean(),
            },
            {
                "assumption": "Tokenization (RecordBreaker)",
                "violated_pct": 100.0 * s["violates_tokenization"].mean(),
            },
            {
                "assumption": "Boundary or Tokenization",
                "violated_pct": 100.0 * s["violates_rb"].mean(),
            },
            {
                "assumption": "Coverage threshold (Datamaran)",
                "violated_pct": 100.0 * (1.0 - s["coverage_ok"].mean()),
            },
        ]
    )
