"""Table 3 benchmark: the pruning-measurement search per dataset.

Each benchmark times the dimensional-split-of-4 search (§6.3.3) on one
dataset; the per-slice pruning rows are accumulated and written to
``results/table3.txt`` when the last dataset finishes.
"""
import pytest

from repro.experiments.report import write_table
from repro.experiments.tables import table3_from_report, table3_search
from repro.vectors.specs import SMALL_DATASETS

_rows: list[dict] = []


@pytest.mark.parametrize("name", SMALL_DATASETS)
def test_table3_pruning_search(benchmark, bundles, name):
    bundle = bundles(name)
    res = benchmark.pedantic(
        lambda: table3_search(bundle), rounds=1, iterations=1
    )
    row = table3_from_report(name, res.report)
    _rows.append(row)
    print(row)
    # shape assertions: slice 1 never prunes, later slices prune more
    assert row["slice1"] == 0.0
    assert row["slice2"] <= row["slice3"] <= row["slice4"]
    if len(_rows) == len(SMALL_DATASETS):
        print(write_table(
            "table3", _rows,
            "Table 3 — average pruning ratio across four nodes (%)",
        ))
