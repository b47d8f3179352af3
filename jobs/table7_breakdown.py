"""Table 7 — IVF query runtime breakdown (OpenAI/1536-like, ≈0.95
recall): per-algorithm total ms + phase shares, paper vs measured.

Run: ``python jobs/table7_breakdown.py [--sf 0.01 --queries 20]``
"""
import argparse

import pandas as pd

from repro.analysis.breakdown import ivf_breakdown
from repro.analysis.paper_numbers import TABLE7_BREAKDOWN


def run(
    sf: float = 0.01, n_queries: int = 20, target_recall: float = 0.95
) -> pd.DataFrame:
    measured = ivf_breakdown(
        "openai1536", sf=sf, n_queries=n_queries, target_recall=target_recall
    )
    cols = [
        "query_time_ms",
        "distance_pct",
        "find_buckets_pct",
        "bounds_pct",
        "query_prep_pct",
    ]
    paper = pd.DataFrame(TABLE7_BREAKDOWN).T[cols]
    m = measured.set_index("algorithm")[cols].round(2)
    out = pd.concat({"paper": paper, "measured": m}, axis=1)
    out.attrs["nprobe"] = measured.attrs["nprobe"]
    return out


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.01)
    ap.add_argument("--queries", type=int, default=20)
    ap.add_argument("--recall", type=float, default=0.95)
    args = ap.parse_args()
    pd.set_option("display.width", 260)
    frame = run(sf=args.sf, n_queries=args.queries, target_recall=args.recall)
    print(
        f"\n=== Table 7: IVF query breakdown (openai1536 stand-in, sf={args.sf}, "
        f"target recall {args.recall}, nprobe={frame.attrs['nprobe']}) ==="
    )
    print(frame.to_string())


if __name__ == "__main__":
    main()
