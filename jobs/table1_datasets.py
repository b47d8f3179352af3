"""Table 1 — Vector datasets.

Prints the paper's dataset registry next to the synthetic stand-ins
actually generated at the requested scale factor (size, #queries,
dimensionality, measured distribution class via per-dimension skewness).

Run: ``python jobs/table1_datasets.py [--sf 0.02]``
"""
import argparse

import numpy as np
import pandas as pd

from repro import vecdata


def run(sf: float = 0.02) -> pd.DataFrame:
    rows = []
    for name, spec in vecdata.DATASETS.items():
        ds = vecdata.generate(name, sf=sf)
        x = ds.data.astype(np.float64)
        skew = float(
            np.median(((x - x.mean(0)) ** 3).mean(0) / (x.std(0) ** 3 + 1e-12))
        )
        rows.append(
            {
                "dataset": name,
                "semantics": spec.semantics,
                "paper_size": spec.paper_n,
                "gen_size": ds.n,
                "paper_queries": spec.paper_queries,
                "gen_queries": len(ds.queries),
                "dim": spec.dim,
                "paper_distribution": spec.distribution,
                "measured_skew": round(skew, 2),
                "measured_class": "skewed" if skew > 0.5 else "normal",
            }
        )
    return pd.DataFrame(rows)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.02)
    args = ap.parse_args()
    pd.set_option("display.width", 220)
    frame = run(sf=args.sf)
    print(f"\n=== Table 1 (stand-ins at sf={args.sf}) ===")
    print(frame.to_string(index=False))
    bad = frame[frame["paper_distribution"] != frame["measured_class"]]
    print(f"\ndistribution-class matches: {len(frame) - len(bad)}/{len(frame)}")


if __name__ == "__main__":
    main()
