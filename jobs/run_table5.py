"""Table 5 — median relative error (%) by aggregation function on the
IDEBench-scaled Power and Flights datasets, PairwiseHist vs DeepDB-lite
vs DBEst++-lite.

Paper setting: datasets scaled to 10^9 rows, 445/427 queries, PH & DeepDB
at 1M samples, DBEst++ at 100k. Ours (substitution, DESIGN.md): scaled to
--rows (default 1M / 400k), --queries per dataset, PH & DeepDB at
--ns, DBEst++ at --ns/10.

Usage: python jobs/run_table5.py [--rows-power 1000000] [--rows-flights 400000]
                                 [--queries 200] [--ns 50000]
"""
import argparse
import json

from _session import get_spark

from repro.experiments.scenarios import compare_engines, make_workload, scaled_dataset
from repro.experiments.tables import table1_row, table5_rows


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--rows-power", type=int, default=1_000_000)
    ap.add_argument("--rows-flights", type=int, default=400_000)
    ap.add_argument("--queries", type=int, default=200)
    ap.add_argument("--ns", type=int, default=50_000)
    ap.add_argument("--out", type=str, default=None)
    args = ap.parse_args()
    spark = get_spark("table5")
    results = {}
    for name, rows in (("power", args.rows_power), ("flights", args.rows_flights)):
        print(f"== scaling {name} to {rows} rows ==", flush=True)
        pdf = scaled_dataset(spark, name, rows)
        queries = make_workload(pdf, n_queries=args.queries, min_selectivity=1e-4, seed=7)
        print(f"workload: {len(queries)} queries", flush=True)
        reports, _, _ = compare_engines(
            spark, pdf, queries, ns_ph=args.ns, ns_db=max(2000, args.ns // 10)
        )
        print("\nTABLE 5 (median relative error %, paper vs ours)")
        print(table5_rows(name, reports))
        print("support / latency / size / build:")
        print(table1_row(reports))
        results[name] = {
            eng: {
                "overall": r.median_error(),
                **{f: r.median_error(f) for f in ["COUNT", "SUM", "AVG", "VAR", "MIN", "MAX", "MEDIAN"]},
                "latency_ms": r.median_latency_ms(),
                "size_kb": r.size_bytes / 1024,
                "build_s": r.build_seconds,
                "supported": r.n_supported,
                "total": r.n_total,
                "sub10_pct": r.error_cdf_point(10.0),
            }
            for eng, r in reports.items()
        }
    if args.out:
        with open(args.out, "w") as f:
            json.dump(results, f, indent=2)
    spark.stop()


if __name__ == "__main__":
    main()
