"""Table 2 benchmark: dataset generation throughput + the stats table."""
import pytest

from benchmarks.conftest import BENCH_CFG
from repro.experiments.report import write_table
from repro.experiments.tables import table2_rows
from repro.vectors.generate import base_numpy
from repro.vectors.specs import SMALL_DATASETS, get_spec


@pytest.mark.parametrize("name", SMALL_DATASETS)
def test_generate_dataset(benchmark, name):
    """Time generating one dataset's base vectors at bench scale."""
    spec = get_spec(name)
    sf = BENCH_CFG.sf_for(spec)
    x = benchmark.pedantic(
        lambda: base_numpy(spec, sf), rounds=1, iterations=1
    )
    assert x.shape == (spec.n_base(sf), spec.dim)


def test_emit_table2(benchmark):
    """Regenerate and persist Table 2 (spec-derived, trivially fast)."""
    rows = benchmark.pedantic(
        lambda: table2_rows(BENCH_CFG), rounds=1, iterations=1
    )
    print(write_table("table2", rows,
                      "Table 2 — dataset statistics (lite analogs)"))
    assert len(rows) == 10
