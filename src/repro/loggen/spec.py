"""Dataset specifications and the renderer that produces (text, truth).

A ``RecordTypeSpec`` is a list of ``LineSpec``s; a ``LineSpec`` is a
sequence of elements: literal strings, ``FieldSpec``s, or ``ListSpec``s
(variable-length lists with a separator — the Array case).  ``render``
lays records and noise down line by line, tracking the absolute char
span of every target field, which the Section 5.1/9.3 success criterion
compares against extraction cut positions.

Note literals *may* contain alphanumeric words ("key=" prefixes): the
paper's assumptions put only special characters in RT-CharSet, so such
words are extracted as constant fields — which the success criterion
handles (constant columns are simply not selected / deleted).
"""
from __future__ import annotations

import random
from dataclasses import dataclass, field as dfield

from .fields import DIRTY_KINDS, FieldSpec


@dataclass(frozen=True)
class ListSpec:
    """A variable-length list of ``elem`` values separated by ``sep``."""

    elem: FieldSpec
    sep: str
    min_n: int = 1
    max_n: int = 4
    target: str | None = None  # the whole joined list as one target


@dataclass(frozen=True)
class LineSpec:
    elements: tuple  # str | FieldSpec | ListSpec


@dataclass(frozen=True)
class RecordTypeSpec:
    name: str
    lines: tuple  # tuple[LineSpec, ...]

    @property
    def span(self) -> int:
        return len(self.lines)

    @property
    def is_dirty(self) -> bool:
        """True if any field value may contain special characters
        (violates RecordBreaker's Tokenization assumption)."""
        for ln in self.lines:
            for el in ln.elements:
                if isinstance(el, FieldSpec) and el.kind in DIRTY_KINDS:
                    return True
                if isinstance(el, ListSpec) and el.elem.kind in DIRTY_KINDS:
                    return True
        return False


@dataclass(frozen=True)
class DatasetSpec:
    name: str
    label: str  # S(NI) | S(I) | M(NI) | M(I) | NS
    types: tuple  # tuple[RecordTypeSpec, ...]
    weights: tuple  # relative frequency per type
    noise_rate: float = 0.0
    target_bytes: int = 30_000
    seed: int = 0

    @property
    def max_span(self) -> int:
        return max((t.span for t in self.types), default=1)


@dataclass
class GTRecord:
    type_id: int
    start_line: int
    end_line: int  # exclusive
    start: int  # absolute char offsets
    end: int
    targets: list = dfield(default_factory=list)  # (name, start, end, value)


@dataclass
class GroundTruth:
    records: list  # list[GTRecord]
    noise_lines: list  # line indices
    types: tuple  # the RecordTypeSpecs, index = type_id


_LETTERS = "abcdefghijklmnopqrstuvwxyz"


def _noise_line(rng: random.Random) -> str:
    """Unstructured noise: random gibberish words and spaces only.

    Words and spaces can't collide with delimiter-bearing record
    templates, and random (non-repeating) vocabulary keeps the line
    incompressible — repeated stock phrases would be real structure by
    the MDL's own lights, and the extractor would rightly find it."""
    n = rng.randint(3, 8)
    words = [
        "".join(rng.choices(_LETTERS, k=rng.randint(2, 9))) for _ in range(n)
    ]
    if rng.random() < 0.3:
        words.insert(rng.randrange(len(words)), str(rng.randint(0, 10**6)))
    return " ".join(words) + "\n"


def _render_record(
    t: RecordTypeSpec, type_id: int, rng: random.Random, line0: int, pos0: int
) -> tuple:
    """Render one record; returns (text, GTRecord)."""
    parts: list = []
    pos = pos0
    rec = GTRecord(type_id, line0, line0 + t.span, pos0, 0)
    for ln in t.lines:
        for el in ln.elements:
            if isinstance(el, str):
                parts.append(el)
                pos += len(el)
            elif isinstance(el, FieldSpec):
                v = el.generate(rng)
                if el.target:
                    rec.targets.append((el.target, pos, pos + len(v), v))
                parts.append(v)
                pos += len(v)
            else:  # ListSpec
                n = rng.randint(el.min_n, el.max_n)
                vals = [el.elem.generate(rng) for _ in range(n)]
                joined = el.sep.join(vals)
                if el.target:
                    rec.targets.append((el.target, pos, pos + len(joined), joined))
                parts.append(joined)
                pos += len(joined)
        parts.append("\n")
        pos += 1
    rec.end = pos
    return "".join(parts), rec


def render(spec: DatasetSpec) -> tuple:
    """Render the dataset; returns (text, GroundTruth).  Deterministic in
    ``spec.seed``.  Stops once ``target_bytes`` characters are emitted."""
    rng = random.Random(spec.seed)
    pieces: list = []
    records: list = []
    noise_lines: list = []
    pos = 0
    line = 0
    total_w = sum(spec.weights) if spec.weights else 1.0
    while pos < spec.target_bytes:
        if spec.types and rng.random() >= spec.noise_rate:
            r = rng.random() * total_w
            acc = 0.0
            tid = 0
            for i, w in enumerate(spec.weights):
                acc += w
                if r < acc:
                    tid = i
                    break
            text, rec = _render_record(spec.types[tid], tid, rng, line, pos)
            pieces.append(text)
            records.append(rec)
            pos = rec.end
            line = rec.end_line
        else:
            ln = _noise_line(rng)
            pieces.append(ln)
            noise_lines.append(line)
            pos += len(ln)
            line += 1
    return "".join(pieces), GroundTruth(records, noise_lines, spec.types)
