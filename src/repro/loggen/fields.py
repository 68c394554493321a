"""Synthetic field-value generators.

Each kind produces strings typical of log files.  ``dirty`` kinds
produce values containing special characters (spaces, '@', '.', '-'),
which violate RecordBreaker's Tokenization assumption (its fixed lexer
treats every special character as formatting) but not DATAMARAN's
milder assumptions — the RT-CharSet search simply excludes those
characters (Section 3.2's justification example).
"""
from __future__ import annotations

import random
from dataclasses import dataclass

_WORDS = (
    "alpha bravo charlie delta echo foxtrot golf hotel india juliet kilo lima "
    "mike november oscar papa quebec romeo sierra tango uniform victor whiskey "
    "xray yankee zulu start stop open close read write query commit fetch scan"
).split()

_MONTHS = "Jan Feb Mar Apr May Jun Jul Aug Sep Oct Nov Dec".split()

#: kinds whose values may contain characters from SPECIAL_CANDIDATES
DIRTY_KINDS = frozenset({"text", "email", "path", "version"})


@dataclass(frozen=True)
class FieldSpec:
    """One generated field.

    ``kind`` selects the generator; ``target`` names the intended
    extraction target this field realises (None = not a target).
    """

    kind: str
    target: str | None = None
    lo: int = 0
    hi: int = 9999
    n_words: int = 3

    def generate(self, rng: random.Random) -> str:
        k = self.kind
        if k == "int":
            return str(rng.randint(self.lo, self.hi))
        if k == "float":
            return f"{rng.uniform(self.lo, self.hi):.3f}"
        if k == "word":
            return rng.choice(_WORDS) + str(rng.randint(0, 99))
        if k == "enum":
            return rng.choice(("INFO", "WARN", "ERROR", "DEBUG", "TRACE"))
        if k == "host":
            return f"srv{rng.randint(1, 20)}"
        if k == "hex":
            return f"{rng.getrandbits(32):08x}"
        if k == "ip":
            return ".".join(str(rng.randint(1, 254)) for _ in range(4))
        if k == "time":
            return f"{rng.randint(0, 23):02d}:{rng.randint(0, 59):02d}:{rng.randint(0, 59):02d}"
        if k == "date":
            return f"{rng.choice(_MONTHS)} {rng.randint(1, 28):02d}"
        if k == "text":  # dirty: contains spaces
            return " ".join(rng.choices(_WORDS, k=rng.randint(1, self.n_words)))
        if k == "email":  # dirty: '@' and '.'
            return f"{rng.choice(_WORDS)}@{rng.choice(_WORDS)}.com"
        if k == "path":  # dirty: '/'
            return "/" + "/".join(rng.choices(_WORDS, k=rng.randint(1, 3)))
        if k == "version":  # dirty: '.'
            return ".".join(str(rng.randint(0, 20)) for _ in range(3))
        raise ValueError(f"unknown field kind {k!r}")


#: Characters that may appear inside values of each dirty kind; used by
#: tests to verify the Tokenization-assumption violation is real.
def dirty_chars(kind: str) -> frozenset:
    return {
        "text": frozenset(" "),
        "email": frozenset("@."),
        "path": frozenset("/"),
        "version": frozenset("."),
    }.get(kind, frozenset())
