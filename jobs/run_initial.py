"""Initial experiments (Sec. 6.1, Fig. 8) — median error and synopsis
size across all 11 datasets: 100 single-predicate COUNT/SUM/AVG queries
per dataset, PairwiseHist vs DeepDB-lite vs DBEst++-lite, plus the
headline ratios (paper: PH 0.28 % median error vs 0.73 % DeepDB and
28.9 % DBEst++; 24x smaller synopses).

Usage: python jobs/run_initial.py [--queries 60] [--ns 10000] [--datasets aqua,power,...]
"""
import argparse
import json

import numpy as np

from _session import get_spark

from repro.datasets import DATASETS
from repro.experiments.scenarios import compare_engines, make_workload, original_dataset


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--queries", type=int, default=60)
    ap.add_argument("--ns", type=int, default=10_000)
    ap.add_argument("--datasets", type=str, default=",".join(DATASETS))
    ap.add_argument("--out", type=str, default=None)
    args = ap.parse_args()
    spark = get_spark("initial")
    rows = {}
    print(f"{'dataset':10s} | {'PH err%':>8s} {'DD err%':>8s} {'DB err%':>8s} | "
          f"{'PH KB':>8s} {'DD KB':>8s} {'DB KB':>8s}")
    for name in args.datasets.split(","):
        pdf = original_dataset(name)
        queries = make_workload(
            pdf,
            n_queries=args.queries,
            funcs=("COUNT", "SUM", "AVG"),
            max_preds=1,
            min_selectivity=1e-4,
            seed=3,
        )
        reports, _, _ = compare_engines(
            spark, pdf, queries, ns_ph=args.ns, ns_db=args.ns, mdn_epochs=30, max_templates=20
        )
        fmt = lambda v: "-" if v is None else f"{v:8.2f}"  # noqa: E731
        print(
            f"{name:10s} | {fmt(reports['PH'].median_error())} "
            f"{fmt(reports['DeepDB'].median_error())} "
            f"{fmt(reports['DBEst++'].median_error())} | "
            f"{reports['PH'].size_bytes/1024:8.1f} "
            f"{reports['DeepDB'].size_bytes/1024:8.1f} "
            f"{reports['DBEst++'].size_bytes/1024:8.1f}",
            flush=True,
        )
        rows[name] = {
            eng: {"err": r.median_error(), "kb": r.size_bytes / 1024, "build_s": r.build_seconds}
            for eng, r in reports.items()
        }
    med = lambda eng, key: float(  # noqa: E731
        np.median([v[eng][key] for v in rows.values() if v[eng][key] is not None])
    )
    print("\nHEADLINE (paper: PH 0.28% vs DD 0.73% vs DB 28.9%; PH 24x smaller)")
    print(
        f"median err%: PH={med('PH','err'):.2f} DeepDB={med('DeepDB','err'):.2f} "
        f"DBEst++={med('DBEst++','err'):.2f}"
    )
    print(
        f"mean size KB: PH={np.mean([v['PH']['kb'] for v in rows.values()]):.1f} "
        f"DeepDB={np.mean([v['DeepDB']['kb'] for v in rows.values()]):.1f} "
        f"DBEst++={np.mean([v['DBEst++']['kb'] for v in rows.values()]):.1f}"
    )
    if args.out:
        with open(args.out, "w") as f:
            json.dump(rows, f, indent=2)
    spark.stop()


if __name__ == "__main__":
    main()
