"""Pruning step (Section 4.2): order candidates by the assimilation
score G(T,S) = Cov x Non_Field_Cov and keep the top M.

The two sources of redundancy (Figure 11) are handled exactly as the
paper argues: sub-templates of a multi-line template have lower Cov;
templates that swallow formatting characters into field values have
lower Non_Field_Cov.  The product demotes both.
"""
from __future__ import annotations


def prune(candidates: list, top_m: int) -> list:
    """Top-M candidates by assimilation score (deterministic tie-break)."""
    # shorter templates first on ties: a k-fold stack of a template
    # ties its base on de-overlapped coverage but is pure redundancy
    ranked = sorted(candidates, key=lambda c: (-c.assimilation, len(c.key), c.key))
    return ranked[:top_m]
