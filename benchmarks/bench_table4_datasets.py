"""Table 4 benchmark — synthetic dataset generation throughput for the
registry (the substrate every experiment stands on)."""
import pytest

from repro.datasets import DATASETS

N = 20_000


@pytest.mark.parametrize("name", ["power", "flights", "taxis", "temp"])
def test_generate_dataset(benchmark, name):
    spec = DATASETS[name]
    pdf = benchmark(lambda: spec.generate(N))
    assert pdf.shape == (N, spec.paper_cols)


def test_idebench_scaleup(benchmark):
    """IDEBench-lite: fit once, benchmark regeneration of 50k rows."""
    from repro import idebench

    base = DATASETS["power"].generate(10_000)
    model = idebench.fit(base)
    out = benchmark(lambda: idebench.generate_pandas(model, 50_000, seed=1))
    assert len(out) == 50_000
