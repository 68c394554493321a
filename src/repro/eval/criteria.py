"""Machine-checkable form of the paper's success criterion (§5.1, §9.3).

An extraction succeeds iff

(a) every ground-truth record's boundaries AND type are identified:
    the extracted (start_line, end_line) spans equal the ground truth
    exactly, no noise line is extracted as a record, and ground-truth
    types are in bijection with extracted templates; and

(b) every intended extraction target can be rebuilt from extracted
    columns with the §9.3 operators (Concat / GroupConcat / Trim /
    Append / Delete*): the target's span must begin and end at a
    *constant offset* from extraction cut boundaries (field/literal
    edges), the same offset in every record of the type.  Offset zero
    is plain Concat; a constant nonzero offset is Trim (§9.3 trims a
    constant number of characters from every entry of a column) — e.g.
    a host extracted as " srv5" with a constant leading space is a
    successful extraction, exactly as in the paper's Figure 13
    discussion of equally-valid template granularities.

For RecordBreaker the same criterion applies over its line-clusters: a
multi-line record type can never satisfy (a) (each line is a separate
"record"), exactly the paper's argument for why RecordBreaker scores 0%
on M(NI)/M(I).
"""
from __future__ import annotations

from dataclasses import dataclass

from ..baseline.recordbreaker import RBResult
from ..core.extract import DatamaranResult
from ..loggen.spec import GroundTruth


@dataclass
class Verdict:
    success: bool
    reason: str = "ok"


def _target_offsets(cuts, s: int, t: int, lo: int, hi: int):
    """Distance from the target span [s, t) to the tightest enclosing
    cut boundaries; None when no cut encloses a side within the record
    span [lo, hi)."""
    c1 = max((c for c in cuts if lo <= c <= s), default=None)
    c2 = min((c for c in cuts if t <= c <= hi), default=None)
    if c1 is None or c2 is None:
        return None
    return (s - c1, c2 - t)


def check_datamaran(truth: GroundTruth, result: DatamaranResult) -> Verdict:
    ext = result.parse.records
    gt = truth.records
    if len(ext) != len(gt):
        return Verdict(False, f"record count {len(ext)} != {len(gt)}")
    type_map: dict = {}
    rev_map: dict = {}
    for e, g in zip(
        sorted(ext, key=lambda r: r.start_line), sorted(gt, key=lambda r: r.start_line)
    ):
        if (e.start_line, e.end_line) != (g.start_line, g.end_line):
            return Verdict(
                False,
                f"boundary mismatch at line {g.start_line}: "
                f"({e.start_line},{e.end_line}) != ({g.start_line},{g.end_line})",
            )
        # record types must be in bijection (criterion (a), "record types
        # correctly identified")
        if type_map.setdefault(g.type_id, e.type_id) != e.type_id:
            return Verdict(False, f"gt type {g.type_id} split across templates")
        if rev_map.setdefault(e.type_id, g.type_id) != g.type_id:
            return Verdict(False, f"template {e.type_id} merges gt types")
    # (b): constant cut offsets per (type, target) across all records
    offsets: dict = {}
    for e, g in zip(
        sorted(ext, key=lambda r: r.start_line), sorted(gt, key=lambda r: r.start_line)
    ):
        if e.cuts is None:
            continue
        for name, s, t, _ in g.targets:
            d = _target_offsets(e.cuts, s, t, e.start, e.end)
            if d is None:
                return Verdict(False, f"target {name} has no enclosing cuts")
            if offsets.setdefault((g.type_id, name), d) != d:
                return Verdict(
                    False, f"target {name} offset varies: {d} vs "
                    f"{offsets[(g.type_id, name)]}"
                )
    return Verdict(True)


def check_recordbreaker(truth: GroundTruth, rb: RBResult) -> Verdict:
    gt = truth.records
    if any(g.end_line - g.start_line > 1 for g in gt):
        return Verdict(False, "multi-line records (Boundary assumption violated)")
    noise = set(truth.noise_lines)
    lines_of_type: dict = {}
    for g in gt:
        lines_of_type.setdefault(g.type_id, set()).add(g.start_line)
    for tid, lines in lines_of_type.items():
        keys = {rb.line_keys[ln] for ln in lines}
        if len(keys) > 1:
            return Verdict(
                False, f"type {tid} fragmented into {len(keys)} structures"
            )
        (key,) = keys
        cluster = set(rb.clusters[key])
        if cluster & noise:
            return Verdict(False, f"type {tid} cluster polluted by noise lines")
        if cluster - lines:
            return Verdict(False, f"type {tid} cluster merges other record types")
    end_of = rb.line_starts[1:] + [len(rb.text)]
    offsets: dict = {}
    for g in gt:
        cuts = rb.cuts[g.start_line]
        if cuts is None:
            return Verdict(False, "line failed to re-parse")
        lo = rb.line_starts[g.start_line]
        hi = end_of[g.start_line]
        for name, s, t, _ in g.targets:
            d = _target_offsets(cuts, s, t, lo, hi)
            if d is None:
                return Verdict(False, f"target {name} has no enclosing cuts")
            if offsets.setdefault((g.type_id, name), d) != d:
                return Verdict(False, f"target {name} offset varies")
    return Verdict(True)
