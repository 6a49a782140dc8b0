"""Table 4 benchmark: index build + distribution (the Fig. 10 stages),
yielding the per-method index memory row for each dataset."""
import pytest

from repro.experiments.report import write_table
from repro.experiments.tables import table4_row
from repro.vectors.specs import SMALL_DATASETS

_rows: list[dict] = []


@pytest.mark.parametrize("name", SMALL_DATASETS)
def test_table4_index_memory(benchmark, bundles, name):
    bundle = bundles(name)
    # First call builds all three distributed indexes (train/add/
    # pre-assign); the timing is the index-construction cost.
    row = benchmark.pedantic(
        lambda: table4_row(bundle), rounds=1, iterations=1
    )
    _rows.append(row)
    print(row)
    assert row["vector_mb"] < row["faiss_mb"] / 2
    assert row["dimension_mb"] > row["vector_mb"]
    if len(_rows) == len(SMALL_DATASETS):
        print(write_table(
            "table4", _rows,
            "Table 4 — index memory (MB): single-node Faiss vs "
            "per-node mean of the distributed layouts",
        ))
