"""Table 6 — query-bound correctness rate and median width for
PairwiseHist vs DeepDB-lite, on original and scaled Power/Flights,
restricted (as the paper does) to the queries DeepDB supports.

Usage: python jobs/run_table6.py [--queries 150] [--ns 30000]
                                 [--rows-scaled-power 1000000] ...
"""
import argparse
import json

from _session import get_spark

from repro.experiments.harness import compute_truths, run_deepdb, run_pairwisehist
from repro.experiments.scenarios import make_workload, original_dataset, scaled_dataset
from repro.experiments.tables import table6_rows


def run_one(spark, tag, pdf, n_queries, ns):
    queries = make_workload(
        pdf, n_queries=n_queries, funcs=("COUNT", "SUM", "AVG"), min_selectivity=1e-4, seed=11
    )
    truths = compute_truths(pdf, queries)
    ph, built = run_pairwisehist(spark, pdf, queries, truths, n_sample=ns)
    dd = run_deepdb(pdf, built.infos, queries, truths, n_sample=ns)
    supported = {id(o.query) for o in dd.outcomes}
    ph.outcomes = [o for o in ph.outcomes if id(o.query) in supported]
    print(table6_rows(tag, ph, dd), flush=True)
    return {
        "PH_rate": ph.bounds_correct_rate(),
        "DD_rate": dd.bounds_correct_rate(),
        "PH_width": ph.median_bound_width(),
        "DD_width": dd.median_bound_width(),
        "n_queries": len(dd.outcomes),
    }


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--queries", type=int, default=150)
    ap.add_argument("--ns", type=int, default=30_000)
    ap.add_argument("--rows-scaled-power", type=int, default=1_000_000)
    ap.add_argument("--rows-scaled-flights", type=int, default=400_000)
    ap.add_argument("--out", type=str, default=None)
    args = ap.parse_args()
    spark = get_spark("table6")
    print("TABLE 6 (bounds correct-rate % and median width %, paper vs ours)")
    results = {}
    results["power-original"] = run_one(
        spark, "power-original", original_dataset("power"), args.queries, args.ns
    )
    results["power-scaled"] = run_one(
        spark,
        "power-scaled",
        scaled_dataset(spark, "power", args.rows_scaled_power),
        args.queries,
        args.ns,
    )
    results["flights-original"] = run_one(
        spark, "flights-original", original_dataset("flights"), args.queries, args.ns
    )
    results["flights-scaled"] = run_one(
        spark,
        "flights-scaled",
        scaled_dataset(spark, "flights", args.rows_scaled_flights),
        args.queries,
        args.ns,
    )
    if args.out:
        with open(args.out, "w") as f:
            json.dump(results, f, indent=2)
    spark.stop()


if __name__ == "__main__":
    main()
