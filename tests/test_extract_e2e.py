"""End-to-end driver tests: infer + extract + relational output, checked
against ground truth (and, where a query result is produced, the DuckDB
oracle — see test_spark_oracle.py for the Spark-side checks)."""
import pandas as pd
import pytest

from repro.core.extract import Params, run_datamaran
from repro.core.relational import result_tables, to_tables
from repro.loggen import DatasetSpec, render
from repro.loggen.corpus import (
    fam_access,
    fam_bracket,
    fam_csv,
    fam_fastq,
    fam_json,
    fam_kv,
    fam_table,
    fam_xml,
)


def make(types, weights=None, noise=0.0, seed=3, size=3000, label="S(NI)"):
    return DatasetSpec(
        "t", label, tuple(types), tuple(weights or [1.0] * len(types)), noise, size, seed
    )


class TestSingleLine:
    def test_csv_values_roundtrip(self):
        text, truth = render(make([fam_csv("x", 4)]))
        res = run_datamaran(text)
        assert len(res.templates) == 1
        tables = result_tables(res)
        root = tables["t0"]
        assert len(root) == len(truth.records)
        # every ground-truth target value appears in the record's row
        rec0 = truth.records[0]
        row0 = root.iloc[0]
        for name, s, e, v in rec0.targets:
            assert any(v == str(x) for x in row0.values if x is not None), (name, v)

    def test_access_log(self):
        text, truth = render(make([fam_access("w")], size=4000))
        res = run_datamaran(text)
        assert len(res.parse.records) == len(truth.records)
        assert not res.parse.noise_lines

    def test_xml_attrs(self):
        text, truth = render(make([fam_xml("x", 4)]))
        res = run_datamaran(text)
        assert len(res.parse.records) == len(truth.records)


class TestMultiLine:
    @pytest.mark.parametrize("span", [3, 5, 8])
    def test_json_spans(self, span):
        text, truth = render(make([fam_json("j", span=span)], label="M(NI)"))
        res = run_datamaran(text)
        assert [
            (r.start_line, r.end_line) for r in res.parse.records
        ] == [(g.start_line, g.end_line) for g in truth.records]

    def test_fastq(self):
        text, truth = render(make([fam_fastq("f")], label="M(NI)"))
        res = run_datamaran(text)
        assert len(res.parse.records) == len(truth.records)

    def test_kv_multiline_grouping(self):
        # per-line key constants make the 3-line grouping the MDL optimum
        text, truth = render(make([fam_kv("k", span=3)], label="M(NI)"))
        res = run_datamaran(text)
        spans = {r.end_line - r.start_line for r in res.parse.records}
        assert spans == {3}


class TestInterleavedAndNoise:
    def test_two_types(self):
        spec = make(
            [fam_bracket("b"), fam_table("t", 4)], weights=[2, 1], label="S(I)", size=5000
        )
        text, truth = render(spec)
        res = run_datamaran(text)
        assert len(res.templates) == 2
        assert len(res.parse.records) == len(truth.records)

    def test_noise_goes_to_noise(self):
        spec = make([fam_csv("x", 4)], noise=0.2, seed=9)
        text, truth = render(spec)
        res = run_datamaran(text)
        assert set(res.parse.noise_lines) == set(truth.noise_lines)

    def test_ns_dataset_extracts_nothing(self):
        spec = DatasetSpec("ns", "NS", (), (), 1.0, 2000, 5)
        text, _ = render(spec)
        res = run_datamaran(text)
        assert res.templates == []


class TestRelational:
    def test_child_table_for_arrays(self):
        # syslog-ish message array becomes a child table with FK
        from repro.loggen.corpus import fam_syslog

        text, truth = render(make([fam_syslog("s", dirty=True)], size=4000))
        res = run_datamaran(text)
        tables = result_tables(res)
        assert "t0" in tables
        child_names = [k for k in tables if k.startswith("t0_a")]
        assert child_names
        child = tables[child_names[0]]
        assert {"record_id", "idx"} <= set(child.columns)
        # FK integrity
        assert set(child["record_id"]) <= set(tables["t0"]["record_id"])

    def test_tables_per_type(self):
        spec = make([fam_csv("a", 3), fam_kv("b")], weights=[1, 1], label="S(I)")
        text, _ = render(spec)
        res = run_datamaran(text)
        tables = result_tables(res)
        assert "t0" in tables and "t1" in tables

    def test_timings_present(self):
        text, _ = render(make([fam_csv("x", 3)], size=1500))
        res = run_datamaran(text)
        assert set(res.timings) == {"generation", "pruning", "evaluation", "extraction"}
        assert all(v >= 0 for v in res.timings.values())


class TestParamsVariants:
    def test_greedy_matches_exhaustive_on_clean_csv(self):
        text, truth = render(make([fam_csv("x", 4)]))
        exh = run_datamaran(text, Params(exhaustive=True))
        gre = run_datamaran(text, Params(exhaustive=False))
        assert len(exh.parse.records) == len(gre.parse.records) == len(truth.records)

    def test_small_m(self):
        text, truth = render(make([fam_csv("x", 4)]))
        res = run_datamaran(text, Params(top_m=3))
        assert len(res.parse.records) == len(truth.records)

    def test_custom_score_fn(self):
        calls = []

        def fn(text, ct, parse):
            calls.append(1)
            from repro.core.mdl import description_length

            return description_length(text, ct, parse)

        text, _ = render(make([fam_csv("x", 3)], size=1500))
        run_datamaran(text, Params(score_fn=fn))
        assert calls  # pluggable scoring exercised
