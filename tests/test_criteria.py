"""Unit tests for the Section 5.1/9.3 success criterion."""
import pytest

from repro.baseline.recordbreaker import run_recordbreaker
from repro.core.extract import Params, run_datamaran
from repro.eval.criteria import check_datamaran, check_recordbreaker
from repro.loggen import DatasetSpec, render
from repro.loggen.corpus import fam_csv, fam_json, fam_kv, fam_syslog


def make(types, weights=None, noise=0.0, seed=3, size=3000, label="S(NI)"):
    return DatasetSpec(
        "t", label, tuple(types), tuple(weights or [1.0] * len(types)), noise, size, seed
    )


class TestDatamaranCriterion:
    def test_clean_csv_succeeds(self):
        text, truth = render(make([fam_csv("x", 4)]))
        v = check_datamaran(truth, run_datamaran(text))
        assert v.success, v.reason

    def test_multiline_json_succeeds(self):
        text, truth = render(make([fam_json("j", span=5)], label="M(NI)"))
        v = check_datamaran(truth, run_datamaran(text))
        assert v.success, v.reason

    def test_noise_tolerated(self):
        text, truth = render(make([fam_kv("k", span=2)], noise=0.15, label="M(NI)"))
        v = check_datamaran(truth, run_datamaran(text))
        assert v.success, v.reason

    def test_dirty_syslog_succeeds(self):
        # the RT-CharSet search + partial unfolding handle text fields
        text, truth = render(make([fam_syslog("s", dirty=True)]))
        v = check_datamaran(truth, run_datamaran(text))
        assert v.success, v.reason

    def test_missing_records_fail(self):
        text, truth = render(make([fam_csv("x", 4)]))
        res = run_datamaran(text)
        res.parse.records = res.parse.records[:-1]
        assert not check_datamaran(truth, res).success

    def test_wrong_boundaries_fail(self):
        text, truth = render(make([fam_json("j", span=4)], label="M(NI)"))
        res = run_datamaran(text)
        res.parse.records[0].start_line += 1
        assert not check_datamaran(truth, res).success

    def test_merged_types_fail(self):
        # force a single-template parse of a two-type dataset
        from repro.loggen.corpus import fam_colonwords

        spec = make(
            [fam_colonwords("a", 3), fam_colonwords("b", 5)],
            weights=[1, 1],
            label="S(I)",
        )
        text, truth = render(spec)
        res = run_datamaran(text)
        if len(res.templates) == 1:
            assert not check_datamaran(truth, res).success
        else:  # exhaustive search may legitimately split them
            pass


class TestRecordBreakerCriterion:
    def test_clean_csv_succeeds(self):
        text, truth = render(make([fam_csv("x", 4)]))
        assert check_recordbreaker(truth, run_recordbreaker(text)).success

    def test_multiline_always_fails(self):
        text, truth = render(make([fam_json("j", span=5)], label="M(NI)"))
        v = check_recordbreaker(truth, run_recordbreaker(text))
        assert not v.success
        assert "Boundary" in v.reason

    def test_dirty_fields_fragment(self):
        text, truth = render(make([fam_syslog("s", dirty=True)]))
        v = check_recordbreaker(truth, run_recordbreaker(text))
        assert not v.success

    def test_clean_interleaved_succeeds(self):
        spec = make([fam_csv("x", 4), fam_kv("y")], weights=[1, 1], label="S(I)")
        text, truth = render(spec)
        assert check_recordbreaker(truth, run_recordbreaker(text)).success

    def test_identical_types_merge_fails(self):
        spec = make([fam_csv("x", 4), fam_csv("y", 4)], weights=[1, 1], label="S(I)")
        text, truth = render(spec)
        v = check_recordbreaker(truth, run_recordbreaker(text))
        assert not v.success
        assert "merges" in v.reason
