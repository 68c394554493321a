"""Unit tests for greedy parsing, value extraction, and cut positions."""
import pytest

from repro.core.parsing import (
    CompiledTemplate,
    coverage_of,
    line_starts_of,
    parse_text,
)
from repro.core.template import FIELD, Lit, reduce_template


def ct_of(rt: str, type_id: int = 0) -> CompiledTemplate:
    return CompiledTemplate(reduce_template(rt), type_id)


def ct_struct(rt: str, type_id: int = 0) -> CompiledTemplate:
    """Struct-only template (no array folding) — \x00 is a field."""
    atoms = tuple(FIELD if ch == "\x00" else Lit(ch) for ch in rt)
    return CompiledTemplate(atoms, type_id)


class TestLineStarts:
    def test_basic(self):
        assert line_starts_of("ab\ncd\n") == [0, 3]

    def test_single_line(self):
        assert line_starts_of("ab\n") == [0]

    def test_empty_lines(self):
        assert line_starts_of("\n\na\n") == [0, 1, 2]


class TestParseSingleLine:
    def test_csv(self):
        # note: the minimal CSV template (F,)*F\n would match a comma-less
        # noise line as a 1-element row (k=0 reps); the refined struct
        # template F,F,F\n used here excludes it
        text = "a,b,c\n1,2,3\n,bad noise\nx,y,z\n"
        parse = parse_text(text, [ct_struct("\x00,\x00,\x00\n")])
        assert [r.start_line for r in parse.records] == [0, 1, 3]
        assert parse.noise_lines == [2]
        assert parse.noise_chars == len(",bad noise\n")

    def test_field_values(self):
        parse = parse_text("k=v\n", [ct_struct("\x00=\x00\n")])
        (rec,) = parse.records
        assert [(f[0], f[1]) for f in rec.fields] == [(0, "k"), (1, "v")]

    def test_spans(self):
        parse = parse_text("ab=cde\n", [ct_of("\x00=\x00\n")])
        (rec,) = parse.records
        assert rec.fields[0][2:] == (0, 2)
        assert rec.fields[1][2:] == (3, 6)

    def test_array_values_pool_one_slot(self):
        parse = parse_text("a,b,c,d\n", [ct_of("\x00,\x00\n")])
        (rec,) = parse.records
        assert [f[1] for f in rec.fields] == ["a", "b", "c", "d"]
        assert {f[0] for f in rec.fields} == {0}
        assert rec.array_counts == [(0, 4)]


class TestParseMultiLine:
    def test_two_line_records(self):
        text = "<h1>\nk=v\n<h2>\nx=y\n"
        parse = parse_text(text, [ct_of("<\x00>\n\x00=\x00\n")])
        assert [(r.start_line, r.end_line) for r in parse.records] == [(0, 2), (2, 4)]
        assert parse.noise_lines == []

    def test_noise_between_records(self):
        text = "<h>\nk=v\n!!!! broken\n<h>\nk=v\n"
        parse = parse_text(text, [ct_of("<\x00>\n\x00=\x00\n")])
        assert len(parse.records) == 2
        assert parse.noise_lines == [2]

    def test_greedy_prefers_first_template(self):
        t_a = ct_struct("\x00=\x00\n", 0)
        t_b = ct_struct("\x00,\x00\n", 1)
        parse = parse_text("a=b\nc,d\n", [t_a, t_b])
        assert [r.type_id for r in parse.records] == [0, 1]

    def test_record_end_alignment(self):
        # record must consume whole lines — end always on a line start
        text = "a,b\nc,d\n"
        parse = parse_text(text, [ct_of("\x00,\x00\n")])
        assert all(text[r.end - 1] == "\n" for r in parse.records)


class TestCuts:
    def test_cuts_on_field_and_literal_boundaries(self):
        text = "[12:34] hi\n"
        parse = parse_text(text, [ct_of("[\x00:\x00] \x00\n")], with_cuts=True)
        (rec,) = parse.records
        # boundaries: 0 [ 1 12 3 : 4 34 6 ] 7 space 8 hi 10 \n 11
        assert {0, 1, 3, 4, 6, 7, 8, 10, 11} <= rec.cuts

    def test_no_cut_inside_field(self):
        parse = parse_text("abcd\n", [ct_of("\x00\n")], with_cuts=True)
        (rec,) = parse.records
        assert 2 not in rec.cuts

    def test_cuts_absent_by_default(self):
        parse = parse_text("abcd\n", [ct_of("\x00\n")])
        assert parse.records[0].cuts is None

    def test_array_separator_cuts(self):
        parse = parse_text("a,b,c\n", [ct_of("\x00,\x00\n")], with_cuts=True)
        (rec,) = parse.records
        assert {0, 1, 2, 3, 4, 5, 6} == rec.cuts


class TestCoverage:
    def test_coverage_counts_record_chars(self):
        text = "a,b\n,noise\nc,d\n"
        parse = parse_text(text, [ct_struct("\x00,\x00\n")])
        assert coverage_of(parse) == 8

    def test_coverage_by_type(self):
        t_a = ct_struct("\x00=\x00\n", 0)
        t_b = ct_struct("\x00,\x00\n", 1)
        parse = parse_text("a=b\ncc,dd\n", [t_a, t_b])
        assert coverage_of(parse, 0) == 4
        assert coverage_of(parse, 1) == 6


class TestPriorityAndOverlap:
    def test_multiline_wins_at_its_start(self):
        # a 2-line template listed first consumes both lines
        t2 = ct_of("<\x00>\n\x00=\x00\n", 0)
        t1 = ct_of("\x00=\x00\n", 1)
        parse = parse_text("<h>\nk=v\nk2=v2\n", [t2, t1])
        assert [(r.type_id, r.start_line, r.end_line) for r in parse.records] == [
            (0, 0, 2),
            (1, 2, 3),
        ]

    def test_empty_template_list_all_noise(self):
        parse = parse_text("a\nb\n", [])
        assert parse.records == [] and parse.noise_lines == [0, 1]
