"""Minimum-description-length regularity score (paper Section 9.2).

F(T, S) is the total number of bits needed to describe the dataset given
the structure template: template text + per-block record/noise flags +
noise at 8 bits/char + records described field-by-field after inferring
a value type (enum / integer / real / string) per field slot.

Lower is better.  The scorer is deliberately a plain function of
(text, template, parse result) so any other scoring modality can be
plugged into the evaluation step (the paper stresses DATAMARAN is
score-agnostic).
"""
from __future__ import annotations

import math
import re
from collections import defaultdict

from .parsing import CompiledTemplate, ParseResult
from .template import serialize

_INT_RE = re.compile(r"-?\d+\Z")
_REAL_RE = re.compile(r"-?\d+\.\d+\Z")

#: Bits used to describe one array instance's repetition count.  The
#: paper says "describe the number of repetitions" without a formula.
ARRAY_COUNT_BITS = 4


def _bits(n: float) -> float:
    """ceil(log2 n) bits per value; a single-valued domain needs 0 bits
    (the value is fully determined by the dictionary/parameters).  This
    zero matters: per-line constants (e.g. literal key names) cost
    nothing once a multi-line record template separates them into their
    own slots, which is precisely the MDL signal that groups k
    structurally-distinct lines into one record."""
    return math.ceil(math.log2(n)) if n > 1 else 0.0


def _slot_dl(values: list) -> float:
    """Cheapest applicable value-type description for one field slot."""
    count = len(values)
    string_dl = sum(len(v) + 1 for v in values) * 8.0
    best = string_dl
    # enumerated type: dictionary of distinct values + log2(n_value) bits each
    distinct = set(values)
    enum_dl = sum(len(v) + 1 for v in distinct) * 8.0 + count * _bits(len(distinct))
    best = min(best, enum_dl)
    if all(_INT_RE.match(v) for v in values):
        ints = [int(v) for v in values]
        lo, hi = min(ints), max(ints)
        best = min(best, 64 + count * _bits(hi - lo + 1))
    elif all(_REAL_RE.match(v) for v in values):
        exp = max(len(v.split(".")[1]) for v in values)
        reals = [float(v) for v in values]
        lo, hi = min(reals), max(reals)
        best = min(best, 64 + count * _bits((hi - lo) * 10**exp + 1))
    return best


def description_length(text: str, ct: CompiledTemplate, parse: ParseResult) -> float:
    """D(dataset) = len(ST)*8 + 32 + m + sum_i D(block_i).

    ``m`` is charged per *line* (record lines + noise lines), not per
    block: a per-block charge would make stacking k single-line records
    into one k-line pseudo-record strictly cheaper by (k-1)/k bits per
    line regardless of content, letting even pure noise "fold" into
    F\\nF\\nF\\n records.  Per-line, grouping is score-neutral and only
    genuine structure (per-line enum/int typing, shared dictionaries)
    decides the record span — which is the MDL's actual job."""
    m = len(parse.noise_lines) + sum(
        r.end_line - r.start_line for r in parse.records
    )
    dl = len(serialize(ct.template)) * 8.0 + 32.0 + m
    dl += parse.noise_chars * 8.0
    slots = defaultdict(list)
    for rec in parse.records:
        for slot, value, _, _ in rec.fields:
            slots[slot].append(value)
        dl += ARRAY_COUNT_BITS * len(rec.array_counts)
    for values in slots.values():
        dl += _slot_dl(values)
    return dl
