"""Fig. 6 shape-check benchmark: QPS-recall sweep on three datasets
(simulated QPS; wall-clock of the harmony search is what's timed)."""
import pytest

from benchmarks.conftest import BENCH_CFG
from repro.experiments.report import write_table
from repro.experiments.tables import fig6_rows

DATASETS = ("sift1m", "star", "glove1.2m")
_rows: list[dict] = []


@pytest.mark.parametrize("name", DATASETS)
def test_fig6_qps_recall(benchmark, bundles, name):
    bundle = bundles(name)
    rows = benchmark.pedantic(
        lambda: fig6_rows(bundle, nprobes=(2, 4, 8, 16)),
        rounds=1, iterations=1,
    )
    _rows.extend(rows)
    for r in rows:
        print(r)
    # shape: at the highest-recall point some distributed mode beats the
    # single-node baseline (scalability claim)
    hi = rows[-1]
    assert max(hi["vector_qps"], hi["dimension_qps"],
               hi["harmony_qps"]) > hi["faiss_qps"]
    if len(_rows) == len(DATASETS) * 4:
        print(write_table(
            "fig6", _rows,
            "Fig. 6 shape check — simulated QPS vs recall "
            f"(sf={BENCH_CFG.sf}, 4 nodes vs 1-node faiss_lite)",
        ))
