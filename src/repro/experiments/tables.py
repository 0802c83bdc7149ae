"""Emit the paper's evaluation tables with our measured numbers beside
the published ones (EXPERIMENTS.md records both)."""
from __future__ import annotations

import io

import pandas as pd

from repro.datasets import DATASETS
from repro.experiments.harness import EngineReport

#: Table 5 — median relative error (%), paper values.
PAPER_TABLE5 = {
    "power": {
        "COUNT": {"PH": 0.19, "DeepDB": 0.05, "DBEst++": 24.82},
        "SUM": {"PH": 0.32, "DeepDB": 14.18, "DBEst++": 56.46},
        "AVG": {"PH": 0.42, "DeepDB": 0.50, "DBEst++": 17.86},
        "VAR": {"PH": 0.84, "DeepDB": None, "DBEst++": 98.50},
        "MIN": {"PH": 0.00, "DeepDB": None, "DBEst++": None},
        "MAX": {"PH": 1.25, "DeepDB": None, "DBEst++": None},
        "MEDIAN": {"PH": 0.00, "DeepDB": None, "DBEst++": None},
        "Overall": {"PH": 0.20, "DeepDB": 0.45, "DBEst++": 56.46},
    },
    "flights": {
        "COUNT": {"PH": 0.38, "DeepDB": 0.41, "DBEst++": 21.65},
        "SUM": {"PH": 1.15, "DeepDB": 1.72, "DBEst++": 3.55},
        "AVG": {"PH": 0.39, "DeepDB": 0.28, "DBEst++": 16.95},
        "VAR": {"PH": 1.67, "DeepDB": None, "DBEst++": 100.00},
        "MIN": {"PH": 0.00, "DeepDB": None, "DBEst++": None},
        "MAX": {"PH": 4.41, "DeepDB": None, "DBEst++": None},
        "MEDIAN": {"PH": 0.29, "DeepDB": None, "DBEst++": None},
        "Overall": {"PH": 0.43, "DeepDB": 0.64, "DBEst++": 28.42},
    },
}

#: Table 6 — bounds correct-rate (%) and median width (%), paper values.
PAPER_TABLE6 = {
    "power-original": {"PH_rate": 70.0, "DD_rate": 40.0, "PH_width": 4.4, "DD_width": 0.7},
    "power-scaled": {"PH_rate": 80.0, "DD_rate": 51.2, "PH_width": 3.4, "DD_width": 0.6},
    "flights-original": {"PH_rate": 78.8, "DD_rate": 50.0, "PH_width": 8.7, "DD_width": 3.0},
    "flights-scaled": {"PH_rate": 78.8, "DD_rate": 75.8, "PH_width": 4.3, "DD_width": 2.3},
}

FUNC_ORDER = ["COUNT", "SUM", "AVG", "VAR", "MIN", "MAX", "MEDIAN", "Overall"]


def _fmt(v, nd=2):
    return "-" if v is None else f"{v:.{nd}f}"


def table4_rows(generated: dict[str, pd.DataFrame]) -> str:
    """Table 4: dataset registry — paper stats vs. our synthetic stats."""
    buf = io.StringIO()
    buf.write(
        f"{'Dataset':10s} {'paper rows':>12s} {'our rows':>10s} "
        f"{'paper cols':>10s} {'our cols':>8s} {'paper MB':>9s} {'our MB':>8s}\n"
    )
    for name, spec in DATASETS.items():
        pdf = generated[name]
        mb = pdf.memory_usage(deep=True).sum() / 1e6
        buf.write(
            f"{name:10s} {spec.paper_rows:12d} {len(pdf):10d} "
            f"{spec.paper_cols:10d} {pdf.shape[1]:8d} {spec.paper_mb:9.1f} {mb:8.1f}\n"
        )
    return buf.getvalue()


def table5_rows(dataset: str, reports: dict[str, EngineReport]) -> str:
    """Table 5: median error by aggregation function, paper vs measured.
    ``reports`` keys: 'PH', 'DeepDB', 'DBEst++'."""
    paper = PAPER_TABLE5.get(dataset, {})
    buf = io.StringIO()
    buf.write(f"-- {dataset} --\n")
    buf.write(
        f"{'Agg':8s} | {'PH paper':>8s} {'PH ours':>8s} | "
        f"{'DD paper':>8s} {'DD ours':>8s} | {'DB paper':>8s} {'DB ours':>8s}\n"
    )
    for func in FUNC_ORDER:
        f = None if func == "Overall" else func
        row = paper.get(func, {})
        buf.write(
            f"{func:8s} | {_fmt(row.get('PH')):>8s} "
            f"{_fmt(reports['PH'].median_error(f)):>8s} | "
            f"{_fmt(row.get('DeepDB')):>8s} "
            f"{_fmt(reports['DeepDB'].median_error(f)):>8s} | "
            f"{_fmt(row.get('DBEst++')):>8s} "
            f"{_fmt(reports['DBEst++'].median_error(f)):>8s}\n"
        )
    return buf.getvalue()


def table6_rows(tag: str, ph: EngineReport, dd: EngineReport) -> str:
    """Table 6 row: bounds correct-rate and width on DeepDB-supported
    queries."""
    paper = PAPER_TABLE6.get(tag, {})
    return (
        f"{tag:18s} | rate%: PH paper={_fmt(paper.get('PH_rate'),1):>5s} "
        f"ours={_fmt(ph.bounds_correct_rate(),1):>5s}  "
        f"DD paper={_fmt(paper.get('DD_rate'),1):>5s} "
        f"ours={_fmt(dd.bounds_correct_rate(),1):>5s} | "
        f"width%: PH paper={_fmt(paper.get('PH_width'),1):>5s} "
        f"ours={_fmt(ph.median_bound_width(),1):>6s}  "
        f"DD paper={_fmt(paper.get('DD_width'),1):>5s} "
        f"ours={_fmt(dd.median_bound_width(),1):>6s}\n"
    )


def table1_row(reports: dict[str, EngineReport]) -> str:
    """Table 1-style summary grid from measured numbers."""
    buf = io.StringIO()
    buf.write(
        f"{'Engine':14s} {'med err %':>10s} {'med lat ms':>11s} {'bounds':>7s} "
        f"{'size KB':>9s} {'build s':>8s} {'supported':>10s}\n"
    )
    for name, r in reports.items():
        buf.write(
            f"{name:14s} {_fmt(r.median_error()):>10s} {_fmt(r.median_latency_ms()):>11s} "
            f"{('yes' if r.bounds_correct_rate() is not None else 'no'):>7s} "
            f"{r.size_bytes / 1024:9.1f} {r.build_seconds:8.1f} "
            f"{r.n_supported:>5d}/{r.n_total:<4d}\n"
        )
    return buf.getvalue()
