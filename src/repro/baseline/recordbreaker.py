"""RecordBreaker baseline (Fisher et al. [20] as automated by [3]).

The paper could not run the open-source RecordBreaker either and
reimplemented it; we do the same.  The defining assumptions (Section
3.4, Table 1) are:

* **Boundary** — every record is exactly one line; and
* **Tokenization** — a fixed lexer: RT-CharSet is predetermined as *all*
  special characters (no per-dataset search).

Each line is lexed with the full special-character set into a skeleton
(its record template), array-folded only on >= 3 consecutive
repetitions (the histogram-confidence analogue of Fisher's
MaxMass/MinCoverage parameters — two occurrences are not enough
evidence for an array), and lines are clustered by skeleton; each
cluster is one inferred structure ("union" branch) and yields one
output table, mirroring RecordBreaker's one-file-per-structure output
observed in the paper's user study.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd

from ..core.parsing import CompiledTemplate, line_starts_of, parse_text
from ..core.template import (
    SPECIAL_CANDIDATES,
    extract_record_template,
    reduce_template,
    serialize,
)

#: Array folding threshold — Fisher's histogram needs repeated evidence.
MIN_REPS = 3


@dataclass
class RBResult:
    line_keys: list  # serialized skeleton per line
    clusters: dict  # key -> list of line indices
    cuts: list  # per line: set of absolute char cut offsets (or None)
    line_starts: list
    text: str

    def tables(self) -> dict:
        """One pandas table per cluster (per inferred structure)."""
        out = {}
        compiled = {k: CompiledTemplate(reduce_template_key(k)) for k in self.clusters}
        end_of = self.line_starts[1:] + [len(self.text)]
        for k, lines in self.clusters.items():
            ct = compiled[k]
            rows = []
            for ln in lines:
                parse = parse_text(
                    self.text[self.line_starts[ln] : end_of[ln]], [ct]
                )
                if parse.records:
                    rows.append([f[1] for f in parse.records[0].fields])
            width = max((len(r) for r in rows), default=0)
            out[k] = pd.DataFrame(
                [r + [None] * (width - len(r)) for r in rows],
                columns=[f"f{i}" for i in range(width)],
            )
        return out


def reduce_template_key(key: str):
    from ..core.template import deserialize

    return deserialize(key)


def run_recordbreaker(text: str) -> RBResult:
    """Cluster every line by its fixed-lexer skeleton and extract."""
    if not text.endswith("\n"):
        text += "\n"
    ls = line_starts_of(text)
    end_of = ls[1:] + [len(text)]
    charset = frozenset(SPECIAL_CANDIDATES)
    line_keys: list = []
    clusters: dict = {}
    cuts: list = []
    compiled: dict = {}
    for i, start in enumerate(ls):
        line = text[start : end_of[i]]
        rt = extract_record_template(line, charset)
        key = serialize(reduce_template(rt, MIN_REPS))
        line_keys.append(key)
        clusters.setdefault(key, []).append(i)
        ct = compiled.get(key)
        if ct is None:
            ct = compiled[key] = CompiledTemplate(reduce_template(rt, MIN_REPS))
        parse = parse_text(line, [ct], with_cuts=True)
        if parse.records:
            cuts.append({start + c for c in parse.records[0].cuts})
        else:  # skeleton built from the line itself always reparses, but
            cuts.append(None)  # stay safe against pathological inputs
    return RBResult(line_keys, clusters, cuts, ls, text)
