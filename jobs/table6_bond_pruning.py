"""Table 6 — PDX-BOND pruning power at Δd=1, K=10 (distance-to-means
order), paper vs measured.

Run: ``python jobs/table6_bond_pruning.py [--sf 0.002 --queries 50]``
"""
import argparse

import pandas as pd

from _pruning_table import run_pruning_table

from repro.analysis.paper_numbers import TABLE6_BOND_PRUNING
from repro.core.pruners import PDXBond


def run(sf: float = 0.002, n_queries: int = 50, seed: int = 0) -> pd.DataFrame:
    return run_pruning_table(
        lambda dim, data: PDXBond(dim, order="means"),
        TABLE6_BOND_PRUNING,
        sf=sf,
        n_queries=n_queries,
        seed=seed,
    )


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.002)
    ap.add_argument("--queries", type=int, default=50)
    args = ap.parse_args()
    pd.set_option("display.width", 220)
    print(f"\n=== Table 6: PDX-BOND pruning power (sf={args.sf}) ===")
    print(run(sf=args.sf, n_queries=args.queries).to_string())


if __name__ == "__main__":
    main()
