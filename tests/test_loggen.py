"""Unit tests for the synthetic log-dataset substrate."""
import random

import pytest

from repro.loggen import DatasetSpec, FieldSpec, github100, manual25, render
from repro.loggen.corpus import (
    fam_access,
    fam_bracket,
    fam_colonwords,
    fam_csv,
    fam_fastq,
    fam_json,
    fam_kv,
    fam_syslog,
    fam_table,
    fam_xml,
)
from repro.loggen.fields import dirty_chars
from repro.loggen.spec import ListSpec


class TestFieldSpecs:
    @pytest.mark.parametrize(
        "kind", ["int", "float", "word", "enum", "host", "hex", "ip", "time", "date"]
    )
    def test_clean_kinds_have_stable_skeleton(self, kind):
        rng = random.Random(0)
        f = FieldSpec(kind)
        vals = [f.generate(rng) for _ in range(50)]
        # clean kinds never contain spaces except 'date' (fixed 1 space)
        if kind == "date":
            assert all(v.count(" ") == 1 for v in vals)
        else:
            assert all(" " not in v for v in vals)

    @pytest.mark.parametrize("kind", ["text", "email", "path", "version"])
    def test_dirty_kinds_contain_specials(self, kind):
        rng = random.Random(1)
        f = FieldSpec(kind, n_words=4)
        vals = [f.generate(rng) for _ in range(100)]
        chars = dirty_chars(kind)
        assert any(any(c in v for c in chars) for v in vals)

    def test_determinism(self):
        f = FieldSpec("word")
        a = [f.generate(random.Random(7)) for _ in range(10)]
        b = [f.generate(random.Random(7)) for _ in range(10)]
        assert a == b

    def test_int_range(self):
        f = FieldSpec("int", lo=5, hi=9)
        rng = random.Random(2)
        assert all(5 <= int(f.generate(rng)) <= 9 for _ in range(50))

    def test_unknown_kind_raises(self):
        with pytest.raises(ValueError):
            FieldSpec("nope").generate(random.Random(0))


class TestRender:
    def spec(self, **kw):
        defaults = dict(
            name="t",
            label="S(NI)",
            types=(fam_csv("x", 3),),
            weights=(1.0,),
            target_bytes=2000,
            seed=3,
        )
        defaults.update(kw)
        return DatasetSpec(**defaults)

    def test_deterministic(self):
        a, _ = render(self.spec())
        b, _ = render(self.spec())
        assert a == b

    def test_reaches_target_size(self):
        text, _ = render(self.spec(target_bytes=5000))
        assert len(text) >= 5000

    def test_record_spans_match_text(self):
        text, truth = render(self.spec())
        for rec in truth.records:
            chunk = text[rec.start : rec.end]
            assert chunk.endswith("\n")
            assert chunk.count("\n") == rec.end_line - rec.start_line

    def test_target_spans_match_values(self):
        text, truth = render(self.spec())
        for rec in truth.records:
            for name, s, e, v in rec.targets:
                assert text[s:e] == v

    def test_multiline_spans(self):
        spec = self.spec(types=(fam_json("j", span=5),))
        text, truth = render(spec)
        for rec in truth.records:
            assert rec.end_line - rec.start_line == 5

    def test_noise_lines_marked(self):
        spec = self.spec(noise_rate=0.3, seed=11)
        text, truth = render(spec)
        assert truth.noise_lines
        lines = text.splitlines()
        rec_lines = {
            i for r in truth.records for i in range(r.start_line, r.end_line)
        }
        for ln in truth.noise_lines:
            assert ln not in rec_lines
            assert all(c.isalnum() or c == " " for c in lines[ln])

    def test_interleaved_types(self):
        spec = self.spec(
            types=(fam_csv("x", 3), fam_kv("y")), weights=(1.0, 1.0), seed=5
        )
        _, truth = render(spec)
        assert {r.type_id for r in truth.records} == {0, 1}

    def test_ns_dataset_all_noise(self):
        spec = self.spec(types=(), weights=(), noise_rate=1.0, label="NS")
        text, truth = render(spec)
        assert truth.records == []
        assert len(truth.noise_lines) == text.count("\n")

    def test_list_spec_renders_joined(self):
        t = fam_syslog("s", dirty=True)
        spec = self.spec(types=(t,))
        text, truth = render(spec)
        rec = truth.records[0]
        names = [t[0] for t in rec.targets]
        assert "s.msg" in names


class TestFamilies:
    @pytest.mark.parametrize(
        "fam",
        [
            fam_csv("a", 4),
            fam_access("a"),
            fam_bracket("a"),
            fam_syslog("a"),
            fam_kv("a", span=3),
            fam_json("a", span=6),
            fam_fastq("a"),
            fam_table("a"),
            fam_xml("a"),
            fam_colonwords("a", 3),
        ],
    )
    def test_families_render(self, fam):
        spec = DatasetSpec("x", "S(NI)", (fam,), (1.0,), 0.0, 1500, 1)
        text, truth = render(spec)
        assert truth.records
        assert all(r.targets for r in truth.records)

    def test_dirty_flag(self):
        assert fam_syslog("a", dirty=True).is_dirty
        assert not fam_syslog("a", dirty=False).is_dirty
        assert fam_csv("a", 4, dirty=True).is_dirty


class TestCorpora:
    def test_manual25_shape(self):
        specs = manual25()
        assert len(specs) == 25
        # Table 5 characteristics: fastq has span 4, thailand span 8
        by_name = {s.name: s for s in specs}
        assert by_name["fastq_genetic"].max_span == 4
        assert by_name["thailand_district"].max_span == 8
        assert len(by_name["netstat_output"].types) == 2

    def test_github100_distribution(self):
        specs = github100()
        assert len(specs) == 100
        from collections import Counter

        c = Counter(s.label for s in specs)
        assert c == {"S(NI)": 44, "S(I)": 14, "M(NI)": 13, "M(I)": 18, "NS": 11}

    def test_github100_dirty_count(self):
        specs = github100()
        sni = [s for s in specs if s.label == "S(NI)"]
        dirty = sum(any(t.is_dirty for t in s.types) for s in sni)
        assert dirty == 19  # Tokenization-assumption violations

    def test_github100_long_records(self):
        specs = github100()
        long = [s for s in specs if s.max_span > 10]
        assert len(long) == 2  # one M(NI), one M(I) — failure cause #1

    def test_seeds_unique(self):
        specs = github100()
        assert len({s.seed for s in specs}) == len(specs)
