"""Unit tests for the MDL regularity score and structure refinement."""
import random

import pytest

from repro.core.mdl import _slot_dl, description_length
from repro.core.parsing import CompiledTemplate, line_starts_of, parse_text
from repro.core.refine import (
    Evaluated,
    _score,
    evaluate_candidates,
    refine_template,
    shift_template,
    unfold_full,
    unfold_partial,
)
from repro.core.generation import generate_candidates
from repro.core.template import FIELD, Array, Lit, pretty, reduce_template


class TestSlotDL:
    def test_int_cheaper_than_string(self):
        vals = [str(i) for i in range(100)]
        assert _slot_dl(vals) < sum(len(v) + 1 for v in vals) * 8

    def test_enum_cheaper_for_repeated_values(self):
        vals = ["alpha", "beta"] * 50
        string_dl = sum(len(v) + 1 for v in vals) * 8
        assert _slot_dl(vals) < string_dl / 4

    def test_real_type(self):
        vals = [f"{i}.{i % 10}" for i in range(50)]
        assert _slot_dl(vals) < sum(len(v) + 1 for v in vals) * 8

    def test_random_strings_fall_back_to_string(self):
        rng = random.Random(0)
        vals = ["".join(rng.choices("abcdefgh", k=8)) for _ in range(50)]
        # distinct random strings: enum dictionary ~ string cost
        assert _slot_dl(vals) <= sum(len(v) + 1 for v in vals) * 8

    def test_single_value(self):
        assert _slot_dl(["x"]) > 0


def _dl(text, rt):
    ct = CompiledTemplate(reduce_template(rt))
    parse = parse_text(text, [ct])
    return description_length(text, ct, parse)


class TestDescriptionLength:
    def test_typed_template_beats_trivial(self):
        rng = random.Random(1)
        text = "".join(
            f"[{rng.randint(10, 99)}:{rng.randint(10, 99)}] code{rng.randint(0, 5)}\n"
            for _ in range(100)
        )
        good = _dl(text, "[\x00:\x00] \x00\n")
        trivial = _dl(text, "\x00\n")
        assert good < trivial

    def test_full_template_beats_subset_on_multiline(self):
        rng = random.Random(2)
        text = "".join(
            f"<{rng.randint(0, 9)}>\nv={rng.randint(100, 999)}\n" for _ in range(60)
        )
        full = _dl(text, "<\x00>\n\x00=\x00\n")
        subset = _dl(text, "\x00=\x00\n")  # leaves header lines as noise
        assert full < subset

    def test_all_noise_baseline(self):
        text = "zq1\nzq2\n"
        ct = CompiledTemplate(reduce_template("\x00=\x00=\x00\n"))
        parse = parse_text(text, [ct])
        dl = description_length(text, ct, parse)
        assert dl >= len(text) * 8  # nothing matched: everything noise


class TestUnfold:
    def setup_method(self):
        self.arr = (Array((FIELD,), ","), Lit("\n"))

    def test_full_unfold(self):
        t = unfold_full(self.arr, (0,), 3)
        assert pretty(t) == "F,F,F\\n"

    def test_partial_unfold(self):
        t = unfold_partial(self.arr, (0,), 2)
        assert pretty(t) == "F,F,(F,)*F\\n"

    def test_nested_path(self):
        inner = Array((FIELD,), ":")
        t = (Array((inner,), "|"), Lit("\n"))
        u = unfold_full(t, (0, 0), 2)
        assert pretty(u) == "(F:F|)*F:F\\n"


class TestRefinement:
    def test_csv_unfolds_to_struct(self):
        # fixed-width CSV with typed columns: struct template wins (4.3.1)
        rng = random.Random(3)
        text = "".join(
            f"id{i},{rng.randint(0, 1)},{rng.uniform(1, 9):.2f}\n" for i in range(120)
        )
        ls = line_starts_of(text)
        ev = refine_template(reduce_template("\x00,\x00,\x00\n"), text, ls)
        assert pretty(ev.ct.template) == "F,F,F\\n"

    def test_partial_unfold_for_text_suffix(self):
        # syslog-like: two regular fields then free text
        rng = random.Random(4)
        words = ["alpha", "beta", "gamma", "delta"]
        text = "".join(
            f"h{rng.randint(1, 3)} p{rng.randint(1, 2)} "
            + " ".join(rng.choices(words, k=rng.randint(2, 5)))
            + "\n"
            for _ in range(150)
        )
        ls = line_starts_of(text)
        ev = refine_template(reduce_template("\x00 \x00 \x00 \x00\n"), text, ls)
        p = pretty(ev.ct.template)
        assert p.startswith("F F ")  # host and program unfolded

    def test_refine_keeps_template_when_no_gain(self):
        text = "a=b\nc=d\n"
        ls = line_starts_of(text)
        t = (FIELD, Lit("="), FIELD, Lit("\n"))
        ev = refine_template(t, text, ls)
        assert ev.ct.template == t


class TestShifting:
    def test_shift_picks_earliest_first_occurrence(self):
        # records are <h>\nk=v\n; a shifted variant k=v\n<h>\n scores the
        # same on adjacent records but first occurs one line later
        text = "<h1>\nk=1\n<h2>\nk=2\n<h3>\nk=3\n"
        ls = line_starts_of(text)
        shifted = reduce_template("\x00=\x00\n<\x00>\n")
        ev = _score(shifted, text, ls)
        out = shift_template(ev, text, ls)
        # reduction folds F=F to (F=)*F; the rotation moves <F> first
        assert pretty(out.ct.template) == "<F>\\n(F=)*F\\n"


class TestEvaluateCandidates:
    def test_selects_true_template(self):
        rng = random.Random(5)
        text = "".join(
            f"[{rng.randint(10, 99)}] u{rng.randint(0, 999)} {rng.uniform(0, 1):.3f}\n"
            for _ in range(100)
        )
        cands = generate_candidates(text, alpha=10, max_span=3)
        ls = line_starts_of(text)
        best = evaluate_candidates(cands[:50], text, ls)
        # two equally valid granularities (paper §5.1: the float may be
        # one field or split at the decimal point)
        assert pretty(best.ct.template) in ("[F] F F.F\\n", "[F] F F\\n")
        assert len(best.parse.records) == 100

    def test_empty_candidates(self):
        assert evaluate_candidates([], "a\n", [0]) is None

    def test_custom_score_fn(self):
        # a score function preferring the most records
        text = "a,b\nc,d\n"
        cands = generate_candidates(text, alpha=10, max_span=2)
        ls = line_starts_of(text)

        def fn(text, ct, parse):
            return -len(parse.records)

        best = evaluate_candidates(cands, text, ls, score_fn=fn)
        assert len(best.parse.records) == 2
