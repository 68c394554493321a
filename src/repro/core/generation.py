"""Generation step (Section 4.1): find structure templates with >= alpha%
coverage by enumerating candidate record boundaries and RT-CharSets.

For each enumerated RT-CharSet we:
  1. compute each line's record-template string (runs of non-template
     chars collapse to one field placeholder) — memoized per charset;
  2. enumerate all line windows of span 1..L (every pair of close-by
     ``\\n`` characters — step 2 of the paper);
  3. reduce each window's record template to its minimal structure
     template (memoized — log files are highly repetitive, so distinct
     windows are few) and accumulate coverage / field coverage / count /
     first occurrence in a hash table keyed by the serialized template.

The window bookkeeping is numpy-vectorized (sliding windows over line
template ids + prefix sums of lengths), so the per-charset cost is a few
numpy passes over the sampled lines, and only *distinct* windows pay the
Python-level reduction cost.

Two RT-CharSet search procedures are implemented per Section 9.1:
``exhaustive`` (all 2^c subsets of the special characters present, c
capped at ``max_charset`` most frequent) and ``greedy`` (grow the set
one character at a time by best assimilation score, O(c^2) subsets).
"""
from __future__ import annotations

import itertools
from collections import Counter
from dataclasses import dataclass

import numpy as np

from .template import (
    SPECIAL_CANDIDATES,
    Template,
    canonical_rotation,
    deserialize,
    extract_record_template,
    has_field,
    reduce_template,
    serialize,
)


@dataclass
class Candidate:
    """One structure-template candidate found by the generation step."""

    key: str  # serialized template (hash key)
    cov: int  # total chars of all candidate records reducing to this key
    field_cov: int  # chars covered by field values within those records
    count: int  # number of candidate records
    first_line: int  # earliest start line among them

    @property
    def template(self) -> Template:
        return deserialize(self.key)

    @property
    def non_field_cov(self) -> int:
        return self.cov - self.field_cov

    @property
    def assimilation(self) -> float:
        """G(T, S) = Cov x Non_Field_Cov (Section 4.2)."""
        return float(self.cov) * float(self.non_field_cov)


def sample_lines(text: str, max_bytes: int, n_chunks: int = 1) -> str:
    """Line-aligned sampling (Section 9.1).  Returns the text if small.

    The default is ONE contiguous chunk from the head of the file.
    Chunk joins are line-aligned but cannot be record-aligned (record
    spans are exactly what we don't know yet); when a multi-line record
    type has identical line templates (k key=value lines), a greedy
    parse that resumes mid-record at a join stays shifted for the rest
    of the chunk, polluting every per-line value pool and erasing the
    MDL signal that makes the k-line grouping win.  The head of the
    file, by contrast, is a guaranteed record/noise boundary.
    Multi-chunk sampling remains available via ``n_chunks``."""
    if len(text) <= max_bytes:
        return text
    chunk = max_bytes // n_chunks
    pieces = []
    step = len(text) // n_chunks
    for k in range(n_chunks):
        start = k * step
        # align to line start
        if start > 0:
            nl = text.find("\n", start)
            if nl == -1:
                break
            start = nl + 1
        end = min(start + chunk, len(text))
        nl = text.rfind("\n", start, end)
        if nl == -1 or nl < start:
            continue
        pieces.append(text[start : nl + 1])
    return "".join(pieces) if pieces else text[: text.rfind("\n") + 1]


def present_specials(text: str, max_charset: int) -> list:
    """Special characters present in the text, most frequent first,
    capped at ``max_charset`` (bounds exhaustive search at 2^c)."""
    counts = Counter(c for c in text if c in SPECIAL_CANDIDATES)
    ranked = sorted(counts, key=lambda c: (-counts[c], c))
    return ranked[:max_charset]


class _WindowIndex:
    """Per-sample precomputation shared across charsets."""

    def __init__(self, text: str):
        if not text.endswith("\n"):
            text += "\n"
        self.text = text
        self.lines = text.splitlines(keepends=True)
        self.line_len = np.array([len(ln) for ln in self.lines], dtype=np.int64)
        self.cum = np.concatenate([[0], np.cumsum(self.line_len)])
        self.total_chars = int(self.cum[-1])


def _accumulate_charset(
    idx: _WindowIndex,
    charset: frozenset,
    max_span: int,
    table: dict,
    reduce_cache: dict,
    floor_chars: float = 0.0,
) -> dict:
    """Run steps 2-5 for one RT-CharSet value; merge into ``table``.

    Returns the charset-local table (used by the greedy search to score
    this charset's best candidate)."""
    tmap: dict = {}
    tpl_list: list = []
    ids = np.empty(len(idx.lines), dtype=np.int64)
    fl = np.empty(len(idx.lines), dtype=np.int64)  # per-line field chars
    for i, ln in enumerate(idx.lines):
        t = extract_record_template(ln, charset)
        j = tmap.get(t)
        if j is None:
            j = len(tpl_list)
            tmap[t] = j
            tpl_list.append(t)
        ids[i] = j
        fl[i] = len(ln) - sum(1 for c in ln if c in charset or c == "\n")
    cum_f = np.concatenate([[0], np.cumsum(fl)])

    local: dict = {}
    n = len(idx.lines)
    for span in range(1, min(max_span, n) + 1):
        win = np.lib.stride_tricks.sliding_window_view(ids, span)
        uniq, inv = np.unique(win, axis=0, return_inverse=True)
        inv = np.asarray(inv).reshape(-1)  # numpy 2.0 axis-unique shape quirk
        order = np.argsort(inv, kind="stable")
        bounds = np.searchsorted(inv[order], np.arange(len(uniq) + 1))
        # Lossless fast-path: a window family's union coverage is bounded
        # by its summed window length; same-key merging below uses max(),
        # so a family below the alpha floor can never create a passing
        # candidate — skip it before paying the Python-level reduction.
        # (Interleaved record types otherwise yield up to 2^span distinct
        # window shapes per charset.)
        wstarts = np.arange(n - span + 1)
        sumlen = np.bincount(
            inv, weights=idx.cum[wstarts + span] - idx.cum[wstarts], minlength=len(uniq)
        )
        for u in range(len(uniq)):
            if sumlen[u] < floor_chars:
                continue
            starts = np.sort(order[bounds[u] : bounds[u + 1]])
            rt = "".join(tpl_list[t] for t in uniq[u])
            key = reduce_cache.get(rt)
            if key is None:
                key = serialize(canonical_rotation(reduce_template(rt)))
                reduce_cache[rt] = key
            # De-overlapped (union) coverage: overlapping windows of the
            # same key (stacked/straddled variants of a shorter true
            # template) must not multiply-count the same characters —
            # Assumption 1's coverage is over *instantiated records*,
            # which cannot overlap.  Merge the [i, i+span) line intervals.
            cov = fcov = 0
            lo = int(starts[0])
            hi = lo + span
            for s_ in starts[1:]:
                s_ = int(s_)
                if s_ <= hi:
                    hi = max(hi, s_ + span)
                else:
                    cov += int(idx.cum[hi] - idx.cum[lo])
                    fcov += int(cum_f[hi] - cum_f[lo])
                    lo, hi = s_, s_ + span
            cov += int(idx.cum[hi] - idx.cum[lo])
            fcov += int(cum_f[hi] - cum_f[lo])
            c = local.get(key)
            if c is None:
                local[key] = Candidate(key, cov, fcov, len(starts), int(starts[0]))
            else:
                c.cov = max(c.cov, cov)
                c.field_cov = max(c.field_cov, fcov)
                c.count += len(starts)
                c.first_line = min(c.first_line, int(starts[0]))
    # Merge into the global table.  The same key found under different
    # charsets denotes the *same* matches (the template fixes its own
    # charset), so merge by max, not sum — no double counting.
    for key, c in local.items():
        g = table.get(key)
        if g is None or c.cov > g.cov:
            table[key] = c
    return local


def _threshold(table: dict, alpha: float, total_chars: int) -> list:
    floor = alpha / 100.0 * total_chars
    out = [
        c
        for c in table.values()
        if c.cov >= floor and has_field(c.template) and c.key.endswith("\n")
    ]
    out.sort(key=lambda c: (-c.assimilation, len(c.key), c.key))
    return out


def generate_candidates(
    text: str,
    *,
    alpha: float = 10.0,
    max_span: int = 10,
    max_charset: int = 10,
    exhaustive: bool = True,
    sample_bytes: int = 64_000,
) -> list:
    """The full generation step.  Returns candidates with >= alpha%
    coverage of the (sampled) text, sorted by assimilation score."""
    sample = sample_lines(text, sample_bytes)
    idx = _WindowIndex(sample)
    specials = present_specials(sample, max_charset)
    table: dict = {}
    reduce_cache: dict = {}
    floor = alpha / 100.0 * idx.total_chars
    if exhaustive:
        for r in range(len(specials) + 1):
            for combo in itertools.combinations(specials, r):
                _accumulate_charset(
                    idx, frozenset(combo), max_span, table, reduce_cache, floor
                )
    else:
        _greedy_charsets(idx, specials, alpha, max_span, table, reduce_cache)
    return _threshold(table, alpha, idx.total_chars)


def _greedy_charsets(
    idx: _WindowIndex,
    specials: list,
    alpha: float,
    max_span: int,
    table: dict,
    reduce_cache: dict,
) -> None:
    """Greedy RT-CharSet search (Section 9.1): start empty, repeatedly add
    the character whose charset yields the best assimilation score."""
    floor = alpha / 100.0 * idx.total_chars
    current: set = set()
    _accumulate_charset(idx, frozenset(), max_span, table, reduce_cache, floor)
    while len(current) < len(specials):
        best_score, best_char = -1.0, None
        for c in specials:
            if c in current:
                continue
            local = _accumulate_charset(
                idx, frozenset(current | {c}), max_span, table, reduce_cache, floor
            )
            eligible = [
                x
                for x in local.values()
                if x.cov >= floor and has_field(x.template) and x.key.endswith("\n")
            ]
            score = max((x.assimilation for x in eligible), default=-1.0)
            if score > best_score:
                best_score, best_char = score, c
        if best_char is None or best_score < 0:
            break  # no structure template with >= alpha% coverage remains
        current.add(best_char)
