"""Reproduce T7 (paper Fig 16): % of datasets where the pruned run finds
the MDL-optimal template, vs M; plus the best-G-is-optimal statistic
(paper: ~40%).

Usage: python jobs/sensitivity_table.py [--out FILE] [--n N]
"""
import sys

from _common import emit

from repro.eval.harness import to_markdown_table
from repro.eval.sensitivity import sensitivity_table
from repro.loggen import manual25


def main(argv):
    out = argv[argv.index("--out") + 1] if "--out" in argv else None
    n = int(argv[argv.index("--n") + 1]) if "--n" in argv else 25
    specs = [s for s in manual25() if s.types][:n]
    df = sensitivity_table(specs)
    emit(
        "T7: parameter sensitivity — found the optimal structure (paper Fig 16)",
        to_markdown_table(df),
        out,
    )


if __name__ == "__main__":
    main(sys.argv[1:])
