"""Greedy LL(1)-style parsing of a log text with structure templates.

``parse_text`` partitions the text's lines into instantiated records and
noise lines (Definition 2.4) by greedy left-to-right scanning: at each
line, the first template (in priority order) that matches starting at
that line consumes the record; otherwise the line is noise.  Because
every template ends with a ``\\n`` literal, a match always ends exactly
on a line boundary.

For speed, a ``CompiledTemplate`` lowers the atom tree to an op plan
(consecutive literals merged into one string op) plus an anchored regex;
the regex (C speed) decides *whether* a record matches, the plan walk
extracts field values, array repetition counts and — when requested —
the *cut positions*: boundaries between atoms/fields.  Cuts drive the
Section 9.3 success criterion (a target is reconstructable with
Concat/Append/Trim/GroupConcat iff its span starts and ends on cuts).
"""
from __future__ import annotations

import re
from dataclasses import dataclass, field

from .template import FIELD, Array, Lit, Template, template_charset, to_regex


#: Field values are plain tuples ``(slot, value, start, end)`` — they are
#: created in the hottest loop, so no dataclass overhead.
@dataclass
class Record:
    type_id: int
    start_line: int
    end_line: int  # exclusive
    start: int  # absolute char offset
    end: int
    fields: list = field(default_factory=list)  # list[(slot, value, start, end)]
    array_counts: list = field(default_factory=list)  # (array_slot, n_reps)
    cuts: set | None = None  # absolute char offsets, when requested


@dataclass
class ParseResult:
    records: list  # list[Record]
    noise_lines: list  # line indices
    noise_chars: int = 0


class WalkError(Exception):
    """The deterministic plan walk diverged from the (backtracking) regex
    match.  Happens only for pathological nested templates whose arrays
    are not strictly LL(1); callers treat the span as a non-match."""


class CompiledTemplate:
    """A structure template with compiled regex, op plan and slot ids.

    Slots number every Field atom (and every Array atom, separately) in
    depth-first traversal order; all elements of one array pool their
    values into the same field slots — that is what makes a field slot a
    relational column (Figure 7).
    """

    def __init__(self, template: Template, type_id: int = 0):
        self.template = template
        self.type_id = type_id
        self.regex = to_regex(template)
        self.charset = template_charset(template) | {"\n"}
        self.field_re = re.compile(
            "[^" + "".join(re.escape(c) for c in sorted(self.charset)) + "]+"
        )
        self.field_slots: dict = {}
        self.array_slots: dict = {}
        self.plan = self._compile(template, path=())

    def _compile(self, t: Template, path: tuple) -> list:
        plan: list = []
        lit_buf: list = []
        for idx, a in enumerate(t):
            p = path + (idx,)
            if isinstance(a, Lit):
                lit_buf.append(a.ch)
                continue
            if lit_buf:
                plan.append(("lit", "".join(lit_buf)))
                lit_buf = []
            if a is FIELD:
                slot = len(self.field_slots)
                self.field_slots[p] = slot
                plan.append(("field", slot))
            else:
                aslot = len(self.array_slots)
                self.array_slots[p] = aslot
                plan.append(("arr", aslot, self._compile(a.body, p), a.sep))
        if lit_buf:
            plan.append(("lit", "".join(lit_buf)))
        return plan


def line_starts_of(text: str) -> list:
    """Absolute offsets of line starts. ``text`` must end with ``\\n``."""
    starts = [0]
    pos = text.find("\n")
    while pos != -1 and pos + 1 < len(text):
        starts.append(pos + 1)
        pos = text.find("\n", pos + 1)
    return starts


def extract_values(ct: CompiledTemplate, text: str, pos: int, rec: Record) -> int:
    """Walk the plan over a span the regex already matched; returns end."""
    return _walk(ct, ct.plan, text, pos, rec)


def _walk(ct: CompiledTemplate, plan: list, text: str, pos: int, rec: Record) -> int:
    cuts = rec.cuts
    for op in plan:
        kind = op[0]
        if kind == "field":
            m = ct.field_re.match(text, pos)
            if m is None:
                raise WalkError(f"empty field at {pos}")
            end = m.end()
            rec.fields.append((op[1], text[pos:end], pos, end))
            if cuts is not None:
                cuts.add(pos)
                cuts.add(end)
            pos = end
        elif kind == "lit":
            s = op[1]
            if not text.startswith(s, pos):
                raise WalkError(f"diverged at {pos}: {text[pos:pos+20]!r} vs {s!r}")
            if cuts is not None:
                cuts.update(range(pos, pos + len(s) + 1))
            pos += len(s)
        else:  # ("arr", aslot, body_plan, sep) — LL(1): sep != terminator
            _, aslot, body, sep = op
            reps = 1
            pos = _walk(ct, body, text, pos, rec)
            while pos < len(text) and text[pos] == sep:
                if cuts is not None:
                    cuts.add(pos)
                    cuts.add(pos + 1)
                pos += 1
                pos = _walk(ct, body, text, pos, rec)
                reps += 1
            rec.array_counts.append((aslot, reps))
    return pos


def parse_text(
    text: str,
    templates: list,
    line_starts: list | None = None,
    with_values: bool = True,
    with_cuts: bool = False,
) -> ParseResult:
    """Greedy scan of the whole text with ``templates`` (priority order)."""
    if line_starts is None:
        line_starts = line_starts_of(text)
    n_lines = len(line_starts)
    end_of = line_starts[1:] + [len(text)]
    records, noise = [], []
    noise_chars = 0
    i = 0
    while i < n_lines:
        pos = line_starts[i]
        matched = False
        for ct in templates:
            m = ct.regex.match(text, pos)
            if m is None or m.end() <= pos:
                continue
            # regex ends with '\n' so m.end() is a line start (or EOF)
            end = m.end()
            rec = Record(ct.type_id, i, 0, pos, end)
            if with_cuts:
                rec.cuts = set()
            if with_values or with_cuts:
                try:
                    got = extract_values(ct, text, pos, rec)
                except WalkError:
                    continue  # not deterministically parseable: skip
                if got != end:
                    continue
            # end line index: number of lines consumed
            j = i
            while j < n_lines and end_of[j] <= end:
                j += 1
            rec.end_line = j
            records.append(rec)
            i = j
            matched = True
            break
        if not matched:
            noise.append(i)
            noise_chars += end_of[i] - pos
            i += 1
    return ParseResult(records, noise, noise_chars)


def coverage_of(parse: ParseResult, type_id: int | None = None) -> int:
    """Total characters covered by records (optionally of one type)."""
    return sum(
        r.end - r.start for r in parse.records if type_id is None or r.type_id == type_id
    )
