"""Unit tests for the structure-template model and reduction."""
import pytest

from repro.core.template import (
    FIELD,
    Array,
    F_CHAR,
    Lit,
    SPECIAL_CANDIDATES,
    deserialize,
    extract_record_template,
    has_field,
    n_fields,
    n_lines_min,
    pretty,
    reduce_template,
    serialize,
    template_charset,
    to_regex,
)


class TestExtractRecordTemplate:
    @pytest.mark.parametrize(
        "record,charset,expected",
        [
            ("a,b,c\n", ",", "\x00,\x00,\x00\n"),
            ("[01:05:02] 1.2.3.4\n", "[]:. ", "[\x00:\x00:\x00] \x00.\x00.\x00.\x00\n"),
            ("abc\n", "", "\x00\n"),
            ("a,b\nc,d\n", ",", "\x00,\x00\n\x00,\x00\n"),
            (",,\n", ",", ",,\n"),  # empty fields vanish — no F atoms
            ("x=1;y=2;\n", "=;", "\x00=\x00;\x00=\x00;\n"),
            ("a b", " ", "\x00 \x00"),
        ],
    )
    def test_basic(self, record, charset, expected):
        assert extract_record_template(record, frozenset(charset)) == expected

    def test_newline_always_template_char(self):
        assert extract_record_template("a\nb\n", frozenset()) == "\x00\n\x00\n"

    def test_chars_outside_charset_become_fields(self):
        # ':' not in charset -> swallowed into the field value
        assert extract_record_template("a:b c\n", frozenset(" ")) == "\x00 \x00\n"

    @pytest.mark.parametrize("ch", sorted(SPECIAL_CANDIDATES)[:10])
    def test_each_special_kept(self, ch):
        rec = f"a{ch}b\n"
        assert extract_record_template(rec, frozenset(ch)) == f"\x00{ch}\x00\n"


class TestReduce:
    def test_csv_folds_to_array(self):
        t = reduce_template("\x00,\x00,\x00,\x00\n")
        assert t == (Array((FIELD,), ","), Lit("\n"))

    def test_two_and_five_fields_same_key(self):
        t2 = reduce_template("\x00,\x00\n")
        t5 = reduce_template("\x00," * 4 + "\x00\n")
        assert serialize(t2) == serialize(t5)

    def test_single_field_not_folded(self):
        assert reduce_template("\x00\n") == (FIELD, Lit("\n"))

    def test_no_fold_when_terminator_equals_sep(self):
        # F,F,F;F,F,F;  inner arrays fold, outer repetition cannot
        # (terminator ';' == separator ';' violates x != y)
        rt = "\x00,\x00,\x00;\x00,\x00,\x00;\n"
        t = reduce_template(rt)
        inner = Array((FIELD,), ",")
        assert t == (inner, Lit(";"), inner, Lit(";"), Lit("\n"))

    def test_repeated_lines_do_not_fold_across_newlines(self):
        # '\n'-separated repeats can't fold (x == y == '\n' violates the
        # grammar); each line's F=F still folds to (F=)*F *within* the line
        rt = "\x00=\x00\n\x00=\x00\n\x00=\x00\n"
        t = reduce_template(rt)
        assert not any(isinstance(a, Array) and a.sep == "\n" for a in t)
        assert sum(1 for a in t if isinstance(a, Lit) and a.ch == "\n") == 3

    def test_nested_array(self):
        # F:F:F|F:F:F|F:F:F,  -> ((F:)*F|)*(F:)*F,
        rt = "|".join(["\x00:\x00:\x00"] * 3) + ",\n"
        t = reduce_template(rt)
        inner = Array((FIELD,), ":")
        assert t == (Array((inner,), "|"), Lit(","), Lit("\n"))

    def test_multiline_record_fold_within_line(self):
        rt = "\x00,\x00,\x00\n\x00;\x00\n"
        t = reduce_template(rt)
        assert t == (
            Array((FIELD,), ","),
            Lit("\n"),
            Array((FIELD,), ";"),
            Lit("\n"),
        )

    def test_sep_in_body_not_folded(self):
        # 'a-b-a-b' with body 'F-F' sep '-' would need sep inside body
        rt = "\x00-\x00-\x00-\x00\n"
        # folds as (F-)*F instead — smallest body wins
        assert reduce_template(rt) == (Array((FIELD,), "-"), Lit("\n"))

    def test_constant_separator_line_unchanged(self):
        rt = "-" * 6 + "\n"
        t = reduce_template(rt)
        assert all(isinstance(a, Lit) for a in t)

    def test_min_bodies_three(self):
        # RecordBreaker-style folding: two bodies are not enough evidence
        assert reduce_template("\x00,\x00\n", 3) == (
            FIELD, Lit(","), FIELD, Lit("\n"),
        )
        assert reduce_template("\x00,\x00,\x00\n", 3) == (
            Array((FIELD,), ","), Lit("\n"),
        )

    def test_space_separated_prefix_folds(self):
        rt = "\x00 \x00 \x00:\x00\n"
        t = reduce_template(rt)
        assert t[0] == Array((FIELD,), " ")


class TestSerialization:
    @pytest.mark.parametrize(
        "rt",
        [
            "\x00,\x00,\x00\n",
            "[\x00:\x00:\x00] \x00.\x00.\x00.\x00\n",
            "|".join(["\x00:\x00:\x00"] * 3) + ",\n",
            "\x00,\x00,\x00;\x00,\x00,\x00;\n",
            "\x00=\x00\n\x00=\x00\n\x00\n",
        ],
    )
    def test_roundtrip(self, rt):
        t = reduce_template(rt)
        assert deserialize(serialize(t)) == t

    def test_pretty_csv(self):
        assert pretty(reduce_template("\x00,\x00,\x00\n")) == "(F,)*F\\n"

    def test_serialize_distinct(self):
        a = serialize(reduce_template("\x00,\x00\n"))
        b = serialize(reduce_template("\x00;\x00\n"))
        assert a != b


class TestTemplateProps:
    def test_charset(self):
        t = reduce_template("[\x00:\x00] \x00,\x00,\x00\n")
        assert template_charset(t) == frozenset("[]: ,\n")

    def test_n_fields(self):
        # (F,)*F\n — the Array atom owns a single F body slot
        assert n_fields(reduce_template("\x00,\x00,\x00\n")) == 1
        # F:F F\n -> (F:)*F F\n (two bodies fold too): 2 field slots
        assert n_fields(reduce_template("\x00:\x00 \x00\n")) == 2

    def test_n_lines(self):
        t = reduce_template("\x00\n\x00\n\x00\n")
        assert n_lines_min(t) == 3

    def test_has_field(self):
        assert has_field(reduce_template("\x00\n"))
        assert not has_field(reduce_template("---\n"))


class TestRegex:
    def test_csv_matches_any_width(self):
        t = reduce_template("\x00,\x00,\x00\n")
        rx = to_regex(t)
        for s in ("a,b\n", "a,b,c,d,e\n", "1,2,3\n"):
            m = rx.match(s)
            assert m and m.end() == len(s)

    def test_csv_array_allows_zero_separators(self):
        # ({A}x)*{A}y allows k=0 repetitions: a single field matches, and
        # ';' outside the charset is just field content
        rx = to_regex(reduce_template("\x00,\x00,\x00\n"))
        for s in ("abc\n", "a;b\n"):
            m = rx.match(s)
            assert m and m.end() == len(s)

    def test_csv_rejects_empty_fields(self):
        rx = to_regex(reduce_template("\x00,\x00,\x00\n"))
        for s in (",a\n", "a,\n", "a,,b\n"):
            m = rx.match(s)
            assert m is None or m.end() != len(s)

    def test_multiline_match(self):
        t = reduce_template("<\x00>\n\x00=\x00\n")
        rx = to_regex(t)
        s = "<hdr>\nkey=value\n"
        m = rx.match(s)
        assert m and m.end() == len(s)

    def test_field_cannot_contain_template_chars(self):
        t = reduce_template("\x00,\x00\n")
        assert to_regex(t).match("a b,c\n")  # space not a template char: ok
        # F F,F\n requires the comma: a space-separated line without one fails
        rx = to_regex(reduce_template("\x00 \x00,\x00\n"))
        m = rx.match("x y\n")
        assert m is None or m.end() != 4


class TestFCharInvariants:
    def test_f_char_is_nul(self):
        assert F_CHAR == "\x00"

    def test_specials_exclude_newline_and_alnum(self):
        assert "\n" not in SPECIAL_CANDIDATES
        assert not any(c.isalnum() for c in SPECIAL_CANDIDATES)
