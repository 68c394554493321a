"""End-to-end DATAMARAN driver: Generation -> Pruning -> Evaluation,
repeated on the unexplained residual to handle interleaved record types
(Section 9.1 "Handling Multiple Structure Templates"), followed by the
final full-dataset extraction with the chosen templates.

``run_datamaran(text, params)`` is the single-machine entry point; the
Spark dataflow in ``spark_ext`` wraps the same functions over chunked
DataFrames.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field, replace

from .generation import generate_candidates, sample_lines
from .parsing import CompiledTemplate, ParseResult, line_starts_of, parse_text
from .pruning import prune
from .refine import Evaluated, evaluate_candidates
from .template import Template, pretty, serialize


@dataclass(frozen=True)
class Params:
    """DATAMARAN parameters (paper Table 2; defaults from Section 5)."""

    alpha: float = 10.0  # minimum coverage threshold, percent
    max_span: int = 10  # L: max lines per record
    top_m: int = 50  # M: candidates surviving the pruning step
    exhaustive: bool = True  # RT-CharSet search variant
    max_charset: int = 10  # cap on c for exhaustive 2^c enumeration
    gen_sample_bytes: int = 64_000
    eval_sample_bytes: int = 16_000
    max_record_types: int = 8
    score_fn: object = None  # plug-in regularity score; None -> MDL


@dataclass
class DatamaranResult:
    templates: list  # list[CompiledTemplate], discovery order = priority
    parse: ParseResult  # final parse of the full text
    timings: dict = field(default_factory=dict)  # step -> seconds
    n_candidates: list = field(default_factory=list)  # K per iteration

    @property
    def template_strings(self) -> list:
        return [pretty(ct.template) for ct in self.templates]


def infer_structures(text: str, params: Params = Params()) -> DatamaranResult:
    """Discover all structure templates with >= alpha% coverage of the
    (residual) dataset, most prominent first."""
    timings = {"generation": 0.0, "pruning": 0.0, "evaluation": 0.0}
    n_candidates = []
    templates: list = []
    seen: set = set()
    residual = text if text.endswith("\n") else text + "\n"
    for _ in range(params.max_record_types):
        if residual.count("\n") < 2:
            break
        t0 = time.perf_counter()
        cands = generate_candidates(
            residual,
            alpha=params.alpha,
            max_span=params.max_span,
            max_charset=params.max_charset,
            exhaustive=params.exhaustive,
            sample_bytes=params.gen_sample_bytes,
        )
        t1 = time.perf_counter()
        cands = [c for c in cands if c.key not in seen]
        n_candidates.append(len(cands))
        kept = prune(cands, params.top_m)
        t2 = time.perf_counter()
        if not kept:
            timings["generation"] += t1 - t0
            timings["pruning"] += t2 - t1
            break
        sample = sample_lines(residual, params.eval_sample_bytes)
        ls = line_starts_of(sample)
        best = evaluate_candidates(kept, sample, ls, score_fn=params.score_fn)
        t3 = time.perf_counter()
        timings["generation"] += t1 - t0
        timings["pruning"] += t2 - t1
        timings["evaluation"] += t3 - t2
        if best is None:
            break
        key = serialize(best.ct.template)
        if key in seen:
            break
        # accept only if the refined template still covers alpha% of the
        # residual sample (Assumption 1 on the residual) ...
        cov = sum(r.end - r.start for r in best.parse.records)
        if cov < params.alpha / 100.0 * len(sample):
            break
        # ... and describes the sample in fewer bits than "no structure
        # at all" (all lines noise at 8 bits/char).  This is what stops
        # the residual loop from "extracting" templates like (F )*F\n
        # out of unstructured prose — the paper's NS datasets, where
        # nothing can be extracted.
        if params.score_fn is None:
            baseline = 32.0 + len(ls) + 8.0 * len(sample)
            if best.score >= baseline:
                break
        seen.add(key)
        templates.append(best.ct)
        residual = _residual(residual, best.ct, params)
    for i, ct in enumerate(templates):
        ct.type_id = i
    return DatamaranResult(templates, ParseResult([], []), timings, n_candidates)


def _residual(text: str, ct: CompiledTemplate, params: Params) -> str:
    """Concatenate the parts of the dataset the template leaves unexplained."""
    parse = parse_text(text, [ct], with_values=False)
    ls = line_starts_of(text)
    end_of = ls[1:] + [len(text)]
    return "".join(text[ls[i] : end_of[i]] for i in parse.noise_lines)


def extract_all(text: str, templates: list) -> ParseResult:
    """Final extraction: one greedy pass of the full text with every
    accepted template (the paper's LL(1)-parser data-extraction step)."""
    if not text.endswith("\n"):
        text += "\n"
    return parse_text(text, templates, with_cuts=True)


def run_datamaran(text: str, params: Params = Params()) -> DatamaranResult:
    """Infer structures, then extract every record from the full text."""
    result = infer_structures(text, params)
    t0 = time.perf_counter()
    result.parse = extract_all(text, result.templates)
    result.timings["extraction"] = time.perf_counter() - t0
    return result


def with_params(**kw) -> Params:
    return replace(Params(), **kw)
