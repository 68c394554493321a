"""Parameter-sensitivity sweep behind the Figure 16 reproduction.

Figure 16 reports, per parameter configuration, the percentage of
datasets for which DATAMARAN finds the *optimal* structure template —
the one with the best regularity score among all templates with >=
alpha% coverage (found by evaluating every candidate, i.e. M = inf).
"""
from __future__ import annotations

import pandas as pd

from ..core.extract import Params
from ..core.generation import generate_candidates, sample_lines
from ..core.parsing import line_starts_of
from ..core.pruning import prune
from ..core.refine import evaluate_candidates
from ..core.template import serialize
from ..loggen.spec import render


def _best_key(cands, text, ls):
    best = evaluate_candidates(cands, text, ls, refine_k=len(cands) or 1)
    return serialize(best.ct.template) if best else None


def found_optimal(spec, m_values=(1, 5, 50), alpha: float = 10.0, max_span: int = 10) -> dict:
    """For one dataset: does the M-pruned run find the same template as
    the evaluate-everything (M = inf) run?"""
    text, _ = render(spec)
    params = Params()
    sample = sample_lines(text, params.eval_sample_bytes)
    ls = line_starts_of(sample)
    cands = generate_candidates(
        text, alpha=alpha, max_span=max_span,
        sample_bytes=params.gen_sample_bytes,
    )
    optimal = _best_key(cands, sample, ls)
    row = {"name": spec.name, "n_candidates": len(cands)}
    for m in m_values:
        key = _best_key(prune(cands, m), sample, ls)
        row[f"M={m}"] = key == optimal
    # "best assimilation = optimal" statistic (paper: ~40% of datasets)
    row["G_rank1_is_optimal"] = bool(cands) and (
        _best_key(prune(cands, 1), sample, ls) == optimal
    )
    return row


def sensitivity_table(specs: list, m_values=(1, 5, 50)) -> pd.DataFrame:
    rows = [found_optimal(s, m_values) for s in specs if s.types]
    df = pd.DataFrame(rows)
    out = {"n_datasets": len(df)}
    for m in m_values:
        out[f"M={m} found optimal %"] = 100.0 * df[f"M={m}"].mean()
    out["best-G is optimal %"] = 100.0 * df["G_rank1_is_optimal"].mean()
    return pd.DataFrame([out])
