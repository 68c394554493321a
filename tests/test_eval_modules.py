"""Tests for the harness, assumption stats, timing and sensitivity
modules (small corpus subsets so they stay fast)."""
import pandas as pd
import pytest

from repro.eval.assumptions import assumption_stats, assumption_table
from repro.eval.harness import (
    ALGOS,
    accuracy_table,
    evaluate_dataset,
    run_corpus,
    to_markdown_table,
)
from repro.eval.sensitivity import found_optimal
from repro.eval.timing import param_sweep, size_sweep
from repro.loggen import DatasetSpec, github100, manual25
from repro.loggen.corpus import fam_csv, fam_json


def tiny(types, label="S(NI)", **kw):
    defaults = dict(weights=(1.0,) * len(types), noise_rate=0.0, target_bytes=2500, seed=4)
    defaults.update(kw)
    return DatasetSpec("tiny", label, tuple(types), **defaults)


class TestEvaluateDataset:
    def test_row_shape(self):
        row = evaluate_dataset(tiny([fam_csv("x", 4)]))
        assert row["label"] == "S(NI)"
        for a in ALGOS:
            assert a in row and f"{a}_secs" in row

    def test_clean_dataset_all_succeed(self):
        row = evaluate_dataset(tiny([fam_csv("x", 4)]))
        assert row["dm_exhaustive"] and row["dm_greedy"] and row["recordbreaker"]

    def test_multiline_rb_fails(self):
        row = evaluate_dataset(tiny([fam_json("j", span=4)], label="M(NI)"))
        assert row["dm_exhaustive"] and not row["recordbreaker"]


class TestAccuracyTable:
    def test_ns_excluded(self):
        df = pd.DataFrame(
            [
                {"label": "S(NI)", "dm_exhaustive": True, "dm_greedy": True, "recordbreaker": False},
                {"label": "NS", "dm_exhaustive": False, "dm_greedy": False, "recordbreaker": False},
            ]
        )
        t = accuracy_table(df)
        assert t[t["label"] == "ALL"]["n"].iloc[0] == 1
        assert t[t["label"] == "ALL"]["dm_exhaustive"].iloc[0] == 100.0

    def test_markdown_render(self):
        df = pd.DataFrame([{"a": 1, "b": 2.5}])
        md = to_markdown_table(df)
        assert md.startswith("| a | b |")
        # iterrows upcasts the mixed row to float
        assert "| 1.0 | 2.5 |" in md


class TestRunCorpus:
    def test_small_subset(self):
        specs = [s for s in github100(target_bytes=2500) if s.label == "S(NI)"][:2]
        df = run_corpus(specs, algos=("dm_greedy", "recordbreaker"))
        assert len(df) == 2
        assert "dm_greedy" in df.columns


class TestAssumptions:
    def test_stats_and_table(self):
        specs = github100(target_bytes=2000)[:10] + [
            s for s in github100(target_bytes=2000) if s.label == "NS"
        ][:2]
        df = assumption_stats(specs)
        assert not df[df["label"] == "NS"]["structured"].any()
        t = assumption_table(df)
        assert len(t) == 4
        assert (t["violated_pct"] >= 0).all()

    def test_corpus_violation_rate_near_paper(self):
        # ~31% of structured datasets are multi-line by construction
        df = assumption_stats(github100(target_bytes=2000))
        s = df[df["structured"]]
        assert 0.25 <= s["violates_boundary"].mean() <= 0.45


class TestTiming:
    def test_size_sweep_shape(self):
        df = size_sweep([8, 16])
        assert list(df["kb"]) == [8, 16]
        assert (df["total_s"] > 0).all()
        assert {"generation_s", "evaluation_s", "extraction_s"} <= set(df.columns)

    def test_param_sweep_shape(self):
        df = param_sweep(base_kb=8, m_values=(5,), l_values=(3,), alpha_values=(10.0,))
        assert set(df["param"]) == {"M", "L", "alpha"}


class TestSensitivity:
    def test_found_optimal_row(self):
        spec = tiny([fam_csv("x", 4)], target_bytes=2000)
        row = found_optimal(spec, m_values=(1, 5))
        assert "M=1" in row and "M=5" in row
        assert row["M=5"] in (True, False)

    def test_manual25_subset(self):
        specs = manual25(min_bytes=2000)[:2]
        for s in specs:
            row = found_optimal(s, m_values=(5,))
            assert row["n_candidates"] >= 1
