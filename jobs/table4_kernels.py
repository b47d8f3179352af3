"""Table 4 — speedup of the PDX distance kernels vs horizontal kernels.

Measures L2 / IP / L1 on random float32 collections across
dimensionalities and sizes (§6.2 methodology, one query vs the whole
collection, no KNN), aggregates at the paper's granularities and prints
paper (per-architecture + average) vs measured.

Run: ``python jobs/table4_kernels.py [--repeat 5]``
"""
import argparse

import pandas as pd

from repro.analysis.kernel_bench import aggregate_table4, kernel_speedups
from repro.analysis.paper_numbers import TABLE4_KERNEL_SPEEDUP


def run(
    repeat: int = 5, dims: list[int] | None = None, sizes: list[int] | None = None
) -> tuple[pd.DataFrame, pd.DataFrame]:
    kw = {"repeat": repeat}
    if dims is not None:
        kw["dims"] = dims
    if sizes is not None:
        kw["sizes"] = sizes
    per = pd.concat(
        [kernel_speedups(m, **kw) for m in ("l2", "ip", "l1")],
        ignore_index=True,
    )
    return per, aggregate_table4(per)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--repeat", type=int, default=5)
    args = ap.parse_args()
    pd.set_option("display.width", 220)
    per, agg = run(repeat=args.repeat)
    print("\n=== Table 4: per-(metric, D, n) timings ===")
    print(per.round(2).to_string(index=False))
    print("\n=== Table 4: measured aggregate speedups (this machine) ===")
    print(agg.round(2).to_string())
    paper = pd.DataFrame(TABLE4_KERNEL_SPEEDUP["avg"]).T
    print("\n=== Table 4: paper average across 4 CPUs ===")
    print(paper.loc[["l2", "ip", "l1"]].to_string())


if __name__ == "__main__":
    main()
