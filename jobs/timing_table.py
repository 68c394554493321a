"""Reproduce T2 (paper Table 3: step complexity) and T6 (Fig 14a/15:
runtime vs size and vs parameters).

Usage: python jobs/timing_table.py [--quick] [--out FILE]
"""
import sys

from _common import emit

from repro.eval.harness import to_markdown_table
from repro.eval.timing import param_sweep, size_sweep


def main(argv):
    out = argv[argv.index("--out") + 1] if "--out" in argv else None
    sizes = [30, 60, 120] if "--quick" in argv else [30, 60, 120, 250, 500, 1000]
    df = size_sweep(sizes)
    emit(
        "T2/T6: runtime vs dataset size (paper Table 3 + Fig 14a). "
        "Generation/pruning/evaluation flatten once sampling caps S_data; "
        "extraction grows ~linearly in T_data",
        to_markdown_table(df.round(3)),
        out,
    )
    dfg = size_sweep(sizes[:3], exhaustive=False)
    emit("T6: greedy-search variant (same sweep)", to_markdown_table(dfg.round(3)), out)
    dfp = param_sweep()
    emit(
        "T6: runtime vs parameters M / L / alpha (paper Fig 15)",
        to_markdown_table(dfp.round(3)),
        out,
    )


if __name__ == "__main__":
    main(sys.argv[1:])
