"""Reproduce T1 (paper Table 1 / §3.4): fraction of datasets violating
each system's assumptions, measured on the GitHub-100 corpus.

Usage: python jobs/assumptions_table.py [--out FILE]
"""
import sys

from _common import emit

from repro.eval.assumptions import assumption_stats, assumption_table
from repro.eval.harness import to_markdown_table
from repro.loggen import github100


def main(argv):
    out = argv[argv.index("--out") + 1] if "--out" in argv else None
    df = assumption_stats(github100())
    emit(
        "T1: assumption violations on the GitHub-100 corpus (paper §3.4: "
        "~31% violate RecordBreaker's Boundary/Tokenization assumptions)",
        to_markdown_table(assumption_table(df)),
        out,
    )


if __name__ == "__main__":
    main(sys.argv[1:])
