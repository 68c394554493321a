"""Structure refinement (Section 4.3) and the evaluation step.

For each of the top-M candidates we hill-climb on the regularity score:

* **Array unfolding** (4.3.1): expand an array into a struct — fully
  (to the modal repetition count) or partially (unfold k leading
  elements, keep the array suffix — the "regular fields mixed into text"
  case, e.g. syslog ``host program message...``).  A revision is kept
  only if the score improves, scored by an honest re-parse (records the
  unfolded template no longer matches fall back to noise and are charged
  as such).
* **Structure shifting** (4.3.2): all cyclic rotations of the template's
  line sequence score nearly equally; pick the rotation whose first
  occurrence in the text is earliest.
"""
from __future__ import annotations

from collections import Counter, defaultdict
from dataclasses import dataclass

from .mdl import description_length
from .parsing import CompiledTemplate, ParseResult, parse_text
from .template import Array, Lit, Template, serialize


@dataclass
class Evaluated:
    ct: CompiledTemplate
    score: float  # description length in bits; lower is better
    parse: ParseResult


def _score(
    template: Template, text: str, line_starts: list, cache: dict | None = None
) -> Evaluated:
    key = serialize(template) if cache is not None else None
    if cache is not None and key in cache:
        return cache[key]
    ct = CompiledTemplate(template)
    parse = parse_text(text, [ct], line_starts)
    ev = Evaluated(ct, description_length(text, ct, parse), parse)
    if cache is not None:
        cache[key] = ev
    return ev


def _array_paths(t: Template, path: tuple = ()) -> list:
    out = []
    for idx, a in enumerate(t):
        if isinstance(a, Array):
            out.append(path + (idx,))
            out.extend(_array_paths(a.body, path + (idx,)))
    return out


def _rewrite(t: Template, path: tuple, replacement: list) -> Template:
    """Replace the atom at ``path`` with ``replacement`` (a list of atoms)."""
    idx = path[0]
    if len(path) == 1:
        return tuple(list(t[:idx]) + replacement + list(t[idx + 1 :]))
    a = t[idx]
    new_body = _rewrite(a.body, path[1:], replacement)
    return tuple(list(t[:idx]) + [Array(new_body, a.sep)] + list(t[idx + 1 :]))


def unfold_full(t: Template, path: tuple, count: int) -> Template:
    """(body sep)*body  ->  body sep body ... body  (count bodies)."""
    a = _at(t, path)
    atoms = list(a.body)
    for _ in range(count - 1):
        atoms.append(Lit(a.sep))
        atoms.extend(a.body)
    return _rewrite(t, path, atoms)


def unfold_partial(t: Template, path: tuple, k: int) -> Template:
    """Unfold k leading elements, keeping the array suffix."""
    a = _at(t, path)
    atoms: list = []
    for _ in range(k):
        atoms.extend(a.body)
        atoms.append(Lit(a.sep))
    atoms.append(a)
    return _rewrite(t, path, atoms)


def _at(t: Template, path: tuple):
    a = t[path[0]]
    for p in path[1:]:
        a = a.body[p]
    return a


def _replace_parent(t: Template, ppath: tuple, new_seq: tuple) -> Template:
    if not ppath:
        return tuple(new_seq)
    pa = _at(t, ppath)
    return _rewrite(t, ppath, [Array(tuple(new_seq), pa.sep)])


def absorb_candidates(t: Template, path: tuple) -> list:
    """Inverse of partial unfolding: merge an adjacent ``body sep`` (or
    ``sep body``) into the array so it matches >= 1 elements.

    Needed when a variable-length field yields two *different* minimal
    templates — e.g. one-word vs multi-word messages reduce to
    ``...,F\\n`` and ``...,F (F )*F\\n``; the unifying structure
    ``...,(F )*F\\n`` (which matches both) is reachable only by
    absorbing the leading element into the array.  This realizes the
    paper's §3.2 claim that one structure template captures all
    count-variants of a list."""
    ppath, i = path[:-1], path[-1]
    parent = t if not ppath else _at(t, ppath).body
    arr = parent[i]
    b = len(arr.body)
    out = []
    if (
        i - b - 1 >= 0
        and parent[i - 1] == Lit(arr.sep)
        and tuple(parent[i - 1 - b : i - 1]) == arr.body
    ):
        out.append(
            _replace_parent(t, ppath, parent[: i - 1 - b] + (arr,) + parent[i + 1 :])
        )
    if (
        i + b + 1 < len(parent)
        and parent[i + 1] == Lit(arr.sep)
        and tuple(parent[i + 2 : i + 2 + b]) == arr.body
    ):
        out.append(
            _replace_parent(t, ppath, parent[: i + 1] + parent[i + 2 + b :])
        )
    return out


def _rep_counts(ev: Evaluated) -> dict:
    """array slot -> Counter of observed repetition counts."""
    counts: dict = defaultdict(Counter)
    for rec in ev.parse.records:
        for slot, reps in rec.array_counts:
            counts[slot][reps] += 1
    return counts


def unfold_all_modal(t: Template, ct, counts: dict) -> Template:
    """Unfold every array to its modal repetition count in one shot —
    the jump straight to the struct form (e.g. per-line key=value
    records whose k arrays all unfold at once), which one-array-per-round
    hill-climbing cannot reach within its round budget."""
    # descending path order: rewriting a later/deeper node never shifts
    # the indices of a not-yet-processed earlier one
    for path in sorted(_array_paths(t), reverse=True):
        slot = ct.array_slots.get(path)
        c = counts.get(slot)
        if not c:
            continue
        (modal, _), = c.most_common(1)
        if modal >= 1:
            t = unfold_full(t, path, modal)
    return t


def refine_template(
    template: Template,
    text: str,
    line_starts: list,
    *,
    max_rounds: int = 5,
    max_partial: int = 2,
    max_arrays: int = 8,
    cache: dict | None = None,
) -> Evaluated:
    """Hill-climb unfoldings while the description length improves."""
    if cache is None:
        cache = {}
    best = _score(template, text, line_starts, cache)
    for _ in range(max_rounds):
        counts = _rep_counts(best)
        improved = None
        if counts:
            allm = unfold_all_modal(best.ct.template, best.ct, counts)
            if allm != best.ct.template:
                ev = _score(allm, text, line_starts, cache)
                if ev.score < best.score:
                    improved = ev
        for path in _array_paths(best.ct.template)[:max_arrays]:
            slot = best.ct.array_slots.get(path)
            c = counts.get(slot)
            if not c:
                continue
            cands = []
            (modal, _), = c.most_common(1)
            if modal > 1:
                cands.append(unfold_full(best.ct.template, path, modal))
            for k in range(1, min(max_partial, max(c)) + 1):
                cands.append(unfold_partial(best.ct.template, path, k))
            cands.extend(absorb_candidates(best.ct.template, path))
            for cand in cands:
                ev = _score(cand, text, line_starts, cache)
                if ev.score < best.score and (
                    improved is None or ev.score < improved.score
                ):
                    improved = ev
        if improved is None:
            break
        best = improved
    return best


def _line_segments(t: Template) -> list:
    """Split top-level atoms after each top-level '\\n' literal."""
    segs, cur = [], []
    for a in t:
        cur.append(a)
        if isinstance(a, Lit) and a.ch == "\n":
            segs.append(cur)
            cur = []
    if cur:
        segs.append(cur)
    return segs


def shift_template(
    ev: Evaluated, text: str, line_starts: list, cache: dict | None = None
) -> Evaluated:
    """Pick the cyclic line-rotation with the earliest first occurrence."""
    segs = _line_segments(ev.ct.template)
    if len(segs) <= 1:
        return ev
    best, best_first = ev, _first_match(ev.ct, text, line_starts)
    for r in range(1, len(segs)):
        rotated = tuple(a for seg in segs[r:] + segs[:r] for a in seg)
        cand = _score(rotated, text, line_starts, cache)
        first = _first_match(cand.ct, text, line_starts)
        if first is not None and (best_first is None or first < best_first):
            best, best_first = cand, first
    return best


def _first_match(ct: CompiledTemplate, text: str, line_starts: list):
    for i, pos in enumerate(line_starts):
        if ct.regex.match(text, pos):
            return i
    return None


def evaluate_candidates(
    candidates: list,
    text: str,
    line_starts: list,
    *,
    score_fn=None,
    refine_k: int = 16,
    refine_margin: float = 1.6,
) -> Evaluated | None:
    """The evaluation step: score each pruned candidate, refine the most
    promising ones, and return the overall best.

    ``score_fn(text, ct, parse) -> float`` may replace MDL (the paper's
    pluggable-regularity-score design).  Refinement is applied to every
    candidate whose raw score is within ``refine_margin`` of the best raw
    score (capped at ``refine_k``) rather than to all M — a performance
    concession for the Python implementation.  The margin matters:
    different stackings of the same line template tie almost exactly in
    raw (array-form) score and only separate after unfolding, so all
    near-ties must be refined before choosing.
    """

    def rescore(ev: Evaluated) -> Evaluated:
        if score_fn is None:
            return ev
        return Evaluated(ev.ct, score_fn(text, ev.ct, ev.parse), ev.parse)

    cache: dict = {}
    scored = [rescore(_score(c.template, text, line_starts, cache)) for c in candidates]
    if not scored:
        return None
    scored.sort(key=lambda e: e.score)
    best = scored[0]
    cutoff = best.score * refine_margin if best.score > 0 else best.score
    # Among raw-score near-ties (5% buckets), refine shorter templates
    # first: the k-line stacks of a base template raw-score within noise
    # of the base, and without this ordering they can occupy every
    # refine slot while the base (whose *refined* form wins) never gets
    # refined.  The shortest in-cutoff templates are force-included for
    # the same reason.
    quantum = abs(best.score) * 0.05 + 1e-9
    in_cutoff = [e for e in scored if e.score <= cutoff]
    candidates_sorted = sorted(
        in_cutoff,
        key=lambda e: (int(e.score / quantum), len(serialize(e.ct.template))),
    )
    to_refine = candidates_sorted[:refine_k]
    shortest = sorted(in_cutoff, key=lambda e: len(serialize(e.ct.template)))[:4]
    for e in shortest:
        if e not in to_refine:
            to_refine.append(e)
    for ev in to_refine:
        r = refine_template(ev.ct.template, text, line_starts, cache=cache)
        r = shift_template(r, text, line_starts, cache)
        r = rescore(r)
        if r.score < best.score:
            best = r
    return best
