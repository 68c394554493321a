"""Timing sweeps behind the Table 3 / Figure 14 / Figure 15 reproductions.

Table 3 states the asymptotic cost of each step:
    Generation  O(S_data * L * 2^c) or O(S_data * L * c^2)
    Pruning     O(K log K)
    Evaluation  O(M * S_data)
    Extraction  O(T_data)
We verify the *shapes* empirically: step wall-times while scaling dataset
size (generation/pruning/evaluation flatten once sampling kicks in,
extraction grows linearly), and while varying the parameters L, M, alpha
(Figure 15).
"""
from __future__ import annotations

import time

import pandas as pd

from ..core.extract import Params, run_datamaran
from ..loggen.spec import DatasetSpec, render
from ..loggen.corpus import fam_syslog


def size_sweep(sizes_kb: list, *, exhaustive: bool = True, seed: int = 17) -> pd.DataFrame:
    """Runtime vs dataset size (Figure 14a) on a syslog-style dataset."""
    rows = []
    for kb in sizes_kb:
        spec = DatasetSpec(
            f"sz{kb}", "S(NI)", (fam_syslog("s", dirty=True),), (1.0,), 0.05,
            kb * 1000, seed,
        )
        text, _ = render(spec)
        t0 = time.perf_counter()
        res = run_datamaran(text, Params(exhaustive=exhaustive))
        total = time.perf_counter() - t0
        rows.append(
            {
                "kb": kb,
                "total_s": total,
                **{f"{k}_s": v for k, v in res.timings.items()},
                "records": len(res.parse.records),
            }
        )
    return pd.DataFrame(rows)


def param_sweep(
    base_kb: int = 60,
    m_values=(5, 20, 50, 200),
    l_values=(3, 5, 10, 15),
    alpha_values=(5.0, 10.0, 20.0),
    seed: int = 18,
) -> pd.DataFrame:
    """Runtime vs parameters M, L, alpha (Figure 15)."""
    spec = DatasetSpec(
        "param", "M(NI)",
        (fam_syslog("s", dirty=True),), (1.0,), 0.05, base_kb * 1000, seed,
    )
    text, _ = render(spec)
    rows = []
    for m in m_values:
        rows.append(_timed(text, Params(top_m=m), "M", m))
    for l in l_values:
        rows.append(_timed(text, Params(max_span=l), "L", l))
    for a in alpha_values:
        rows.append(_timed(text, Params(alpha=a), "alpha", a))
    return pd.DataFrame(rows)


def _timed(text: str, params: Params, param: str, value) -> dict:
    t0 = time.perf_counter()
    res = run_datamaran(text, params)
    return {
        "param": param,
        "value": value,
        "total_s": time.perf_counter() - t0,
        **{f"{k}_s": v for k, v in res.timings.items()},
    }
