"""Table 5 benchmark: query workload per mode, yielding peak per-node
memory rows."""
import pytest

from repro.experiments.report import write_table
from repro.experiments.tables import table5_row
from repro.vectors.specs import SMALL_DATASETS

_rows: list[dict] = []


@pytest.mark.parametrize("name", SMALL_DATASETS)
def test_table5_peak_memory(benchmark, bundles, name):
    bundle = bundles(name)
    row = benchmark.pedantic(
        lambda: table5_row(bundle), rounds=1, iterations=1
    )
    _rows.append(row)
    print(row)
    assert row["vector_mb"] <= row["dimension_mb"]
    if len(_rows) == len(SMALL_DATASETS):
        print(write_table(
            "table5", _rows,
            "Table 5 — peak per-node memory during queries (MB)",
        ))
