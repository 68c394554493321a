"""Structure-template model (paper Assumption 3) and template reduction.

A *record template* is a string over literal characters plus the field
placeholder (Definition 2.1).  A *structure template* (Definition 2.3) is
a regular expression over record templates restricted to the paper's
Struct/Array grammar:

    Array:  ({body}x)*{body}y        -- x, y distinct characters
    Struct: sequence of literals, fields, arrays

We represent structure templates as a tuple of atoms:

    Lit(ch)          -- one literal (template/formatting) character
    FIELD            -- the field placeholder 'F'
    Array(body, sep) -- ``(body sep)* body``; the terminator is whatever
                        atom follows the array in the enclosing struct

``reduce_template`` folds a record template into its *minimal structure
template* — the canonical form used as the hash key in the generation
step (Section 4.1 step 4).  Folding honours the grammar's x != y rule:
a repetition whose terminator equals its separator is not an LL(1)
array and is left unfolded.
"""
from __future__ import annotations

import re
from dataclasses import dataclass
from functools import lru_cache

#: Placeholder character used in string-form record templates.  NUL never
#: occurs in log text (loggen strips control chars; real logs are text).
F_CHAR = "\x00"
_ARR_OPEN = "\x01"
_ARR_CLOSE = "\x02"

#: RT-CharSet-Candidate (Section 3.2): template characters are drawn from
#: special characters only.  '\n' is handled separately — it is *always*
#: a template character because blocks are newline-separated (Def 2.4).
SPECIAL_CANDIDATES = frozenset(" \t!\"#$%&'()*+,-./:;<=>?@[\\]^_`{|}~")


@dataclass(frozen=True)
class Lit:
    """One literal template character."""

    ch: str

    def __repr__(self) -> str:  # compact in test diffs
        return f"L({self.ch!r})"


class _Field:
    """Singleton field placeholder atom."""

    __slots__ = ()
    _instance = None

    def __new__(cls):
        if cls._instance is None:
            cls._instance = super().__new__(cls)
        return cls._instance

    def __repr__(self) -> str:
        return "F"


FIELD = _Field()


@dataclass(frozen=True)
class Array:
    """``(body sep)* body`` — a list of repetitions of ``body`` separated
    by the single character ``sep`` (paper Assumption 3 Array form)."""

    body: tuple
    sep: str

    def __repr__(self) -> str:
        return f"A({list(self.body)!r},{self.sep!r})"


Template = tuple  # tuple of atoms (top-level Struct)


def extract_record_template(record: str, charset: frozenset) -> str:
    """Record -> record template given RT-CharSet (Section 4.1 step 3).

    Characters in ``charset`` (plus ``\\n``) are kept as template
    literals; every maximal run of other characters becomes one field
    placeholder.  Assumption 2 (non-overlapping character sets) is what
    makes this well-defined.
    """
    out = []
    in_field = False
    keep = charset
    for ch in record:
        if ch in keep or ch == "\n":
            out.append(ch)
            in_field = False
        elif not in_field:
            out.append(F_CHAR)
            in_field = True
    return "".join(out)


def _top_level_lits(body: tuple) -> set:
    return {a.ch for a in body if isinstance(a, Lit)}


def _contains_newline(body: tuple) -> bool:
    for a in body:
        if isinstance(a, Lit) and a.ch == "\n":
            return True
        if isinstance(a, Array) and _contains_newline(a.body):
            return True
    return False


def _fold_once(atoms: list, min_bodies: int) -> bool:
    """Find the leftmost, smallest-body array repetition and fold it.

    Pattern: body sep body (sep body)* followed by a terminator atom that
    differs from sep.  Returns True if a fold was applied.
    """
    n = len(atoms)
    for b in range(1, n // 2 + 1):
        i = 0
        while i + 2 * b + 1 <= n:
            sepa = atoms[i + b]
            if (
                isinstance(sepa, Lit)
                and sepa.ch != "\n"  # '\n'-separated repeats can't terminate (x==y)
                and atoms[i : i + b] == atoms[i + b + 1 : i + 2 * b + 1]
            ):
                body = tuple(atoms[i : i + b])
                sep = sepa.ch
                # arrays are intra-line lists: folding bodies that span
                # lines would let overlapping multi-line windows of
                # single-line records coalesce into spurious nested
                # templates with inflated (overlap-counted) coverage
                if sep in _top_level_lits(body) or _contains_newline(body):
                    i += 1
                    continue
                end = i + 2 * b + 1  # exclusive, just past the 2nd body
                nb = 2
                while (
                    end + b + 1 <= n
                    and atoms[end] == sepa
                    and atoms[end + 1 : end + 1 + b] == list(body)
                ):
                    end += b + 1
                    nb += 1
                # terminator must exist and differ from sep (x != y)
                if end < n and not (
                    isinstance(atoms[end], Lit) and atoms[end].ch == sep
                ) and nb >= min_bodies:
                    atoms[i:end] = [Array(body, sep)]
                    return True
            i += 1
    return False


@lru_cache(maxsize=200_000)
def reduce_template(rt: str, min_bodies: int = 2) -> Template:
    """Record template string -> minimal structure template (step 4).

    ``min_bodies`` is the number of consecutive repetitions required
    before folding into an array: 2 for DATAMARAN; the RecordBreaker
    baseline uses 3 (its histogram-based array inference needs more
    evidence — the MaxMass/MinCoverage analogue).
    """
    atoms: list = [FIELD if ch == F_CHAR else Lit(ch) for ch in rt]
    while _fold_once(atoms, min_bodies):
        pass
    return tuple(atoms)


def serialize(t: Template) -> str:
    """Canonical string form — the hash key used by the generation step."""
    out = []
    for a in t:
        if a is FIELD:
            out.append(F_CHAR)
        elif isinstance(a, Lit):
            out.append(a.ch)
        else:
            out.append(_ARR_OPEN + serialize(a.body) + a.sep + _ARR_CLOSE)
    return "".join(out)


def deserialize(s: str) -> Template:
    atoms, _ = _deser(s, 0, len(s))
    return tuple(atoms)


def _deser(s: str, i: int, end: int):
    atoms = []
    while i < end:
        ch = s[i]
        if ch == F_CHAR:
            atoms.append(FIELD)
            i += 1
        elif ch == _ARR_OPEN:
            depth, j = 1, i + 1
            while depth:
                if s[j] == _ARR_OPEN:
                    depth += 1
                elif s[j] == _ARR_CLOSE:
                    depth -= 1
                j += 1
            inner = s[i + 1 : j - 1]
            body, _ = _deser(inner, 0, len(inner) - 1)
            atoms.append(Array(tuple(body), inner[-1]))
            i = j
        else:
            atoms.append(Lit(ch))
            i += 1
    return atoms, i


def pretty(t: Template) -> str:
    """Human-readable form, paper style: ``(F,)*F\\n`` with F for fields."""
    out = []
    for a in t:
        if a is FIELD:
            out.append("F")
        elif isinstance(a, Lit):
            out.append("\\n" if a.ch == "\n" else a.ch)
        else:
            out.append(f"({pretty(a.body)}{a.sep})*{pretty(a.body)}")
    return "".join(out)


def template_charset(t: Template) -> frozenset:
    """RT-CharSet(ST): every literal/separator character of the template."""
    chars = set()
    for a in t:
        if isinstance(a, Lit):
            chars.add(a.ch)
        elif isinstance(a, Array):
            chars.add(a.sep)
            chars |= template_charset(a.body)
    return frozenset(chars)


def _cls(chars: frozenset) -> str:
    return "[^" + "".join(re.escape(c) for c in sorted(chars)) + "]+"


def _atom_regex(a, field_pat: str) -> str:
    if a is FIELD:
        return field_pat
    if isinstance(a, Lit):
        return re.escape(a.ch)
    body = "".join(_atom_regex(x, field_pat) for x in a.body)
    return f"(?:{body}{re.escape(a.sep)})*{body}"


def to_regex(t: Template):
    """Compile a structure template into an anchored regex.

    Field values match any nonempty run of characters outside
    RT-CharSet(ST) — Assumption 2 again — which makes matching
    effectively deterministic (the LL(1) property)."""
    cs = template_charset(t) | {"\n"}
    field_pat = _cls(cs)
    return re.compile("".join(_atom_regex(a, field_pat) for a in t))


def n_fields(t: Template) -> int:
    total = 0
    for a in t:
        if a is FIELD:
            total += 1
        elif isinstance(a, Array):
            total += n_fields(a.body)
    return total


def n_lines_min(t: Template) -> int:
    """Minimum number of lines one record of this template spans."""
    total = 0
    for a in t:
        if isinstance(a, Lit) and a.ch == "\n":
            total += 1
        elif isinstance(a, Array):
            total += n_lines_min(a.body)  # one repetition minimum
    return total


def has_field(t: Template) -> bool:
    return n_fields(t) > 0


def line_segments(t: Template) -> list:
    """Split top-level atoms after each top-level ``\\n`` literal."""
    segs, cur = [], []
    for a in t:
        cur.append(a)
        if isinstance(a, Lit) and a.ch == "\n":
            segs.append(cur)
            cur = []
    if cur:
        segs.append(cur)
    return segs


def canonical_rotation(t: Template) -> Template:
    """Canonicalize a multi-line template across cyclic line rotations.

    Windows that straddle record boundaries produce rotated variants of
    the true multi-line template; hashing them into one bin (keyed by
    the lexicographically-smallest rotation) collapses that whole family
    of redundant candidates.  Structure shifting (Section 4.3.2) later
    picks the rotation with the earliest first occurrence."""
    segs = line_segments(t)
    if len(segs) <= 1:
        return t
    best = None
    for r in range(len(segs)):
        cand = tuple(a for seg in segs[r:] + segs[:r] for a in seg)
        s = serialize(cand)
        if best is None or s < best[0]:
            best = (s, cand)
    return best[1]
