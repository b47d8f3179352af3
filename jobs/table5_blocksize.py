"""Table 5 — effect of the PDX block size on the L2 kernel speedup.

Run: ``python jobs/table5_blocksize.py [--repeat 5]``
"""
import argparse

import pandas as pd

from repro.analysis.kernel_bench import table5_blocksize
from repro.analysis.paper_numbers import TABLE5_BLOCKSIZE


def run(
    repeat: int = 5, dims: list[int] | None = None, sizes: list[int] | None = None
) -> pd.DataFrame:
    kw = {"repeat": repeat}
    if dims is not None:
        kw["dims"] = dims
    if sizes is not None:
        kw["sizes"] = sizes
    measured = table5_blocksize(**kw).set_index("block_size")["speedup"]
    frame = pd.DataFrame(TABLE5_BLOCKSIZE).T
    frame.loc["measured (this machine)"] = measured.round(2)
    frame.index.name = "architecture"
    return frame


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--repeat", type=int, default=5)
    args = ap.parse_args()
    pd.set_option("display.width", 200)
    print("\n=== Table 5: avg L2 PDX speedup per block size ===")
    print(run(repeat=args.repeat).to_string())


if __name__ == "__main__":
    main()
