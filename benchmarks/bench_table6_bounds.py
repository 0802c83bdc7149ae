"""Table 6 benchmark — query-bound computation: latency of bounded
execution and the correctness/width statistics the table reports."""
import numpy as np

from repro.queries import Cond, Query


def test_ph_bounds_statistics(benchmark, ph_engine, power_workload, power_truths):
    results = benchmark(lambda: [ph_engine.execute(q) for q in power_workload])
    correct, widths = [], []
    for i, r in enumerate(results):
        t = power_truths[i]
        if t in (None, 0) or r.lo is None:
            continue
        correct.append(r.lo - 1e-9 <= t <= r.hi + 1e-9)
        widths.append((r.hi - r.lo) / abs(t))
    assert len(correct) >= 20
    # Table 6 regime: PH correct-rate ~70-80%; assert a sane floor.
    assert float(np.mean(correct)) > 0.5
    assert float(np.median(widths)) < 2.0


def test_deepdb_bounds_statistics(benchmark, deepdb_model, power_workload, power_truths):
    supported = [(i, q) for i, q in enumerate(power_workload) if deepdb_model.supports(q)]

    def run():
        return [(i, deepdb_model.execute(q)) for i, q in supported]

    results = benchmark(run)
    widths = [
        (r.hi - r.lo) / abs(power_truths[i])
        for i, r in results
        if power_truths[i] not in (None, 0) and r.lo is not None
    ]
    # DeepDB bounds are narrow (the paper calls them overly optimistic)
    assert float(np.median(widths)) < 1.0


def test_single_query_bounded_latency(benchmark, ph_engine):
    """Sub-ms per bounded query (Table 1 'sub-ms' row)."""
    q = Query("SUM", "voltage", Cond("global_active_power", "<", 1.5))
    r = benchmark(ph_engine.execute, q)
    assert r.lo is not None and r.hi is not None
