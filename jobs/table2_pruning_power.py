"""Table 2 — ADSampling pruning power at Δd=1, K=10.

Best / p50 / p25 / worst percentage of dimension values avoided, per
dataset, paper vs measured.

Run: ``python jobs/table2_pruning_power.py [--sf 0.002 --queries 50]``
"""
import argparse

import pandas as pd

from _pruning_table import run_pruning_table

from repro.analysis.paper_numbers import TABLE2_ADS_PRUNING
from repro.core.pruners import ADSampling


def run(sf: float = 0.002, n_queries: int = 50, seed: int = 0) -> pd.DataFrame:
    return run_pruning_table(
        lambda dim, data: ADSampling(dim, seed=seed),
        TABLE2_ADS_PRUNING,
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
    print(f"\n=== Table 2: ADSampling pruning power (sf={args.sf}) ===")
    print(run(sf=args.sf, n_queries=args.queries).to_string())


if __name__ == "__main__":
    main()
