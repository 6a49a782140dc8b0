"""Regenerate paper Table 5 (peak query-time memory per node).

Usage: spark-submit jobs/table5_peak_memory.py [--sf 0.01]
"""
try:  # direct spark-submit (sys.path[0] = jobs/) or module run
    from _common import config_from, parse_args
except ImportError:
    from jobs._common import config_from, parse_args
from repro.experiments.report import write_table
from repro.experiments.runner import DatasetBundle
from repro.experiments.tables import small_dataset_names, table5_row
from repro.sparkutil import get_session


def main() -> None:
    args = parse_args(__doc__)
    spark = get_session("table5")
    cfg = config_from(args)
    rows = []
    for name in args.datasets or small_dataset_names():
        bundle = DatasetBundle(spark, name, cfg)
        rows.append(table5_row(bundle))
        bundle.close()
    print(write_table(
        "table5", rows,
        "Table 5 — peak per-node memory during the query workload (MB)",
    ))
    spark.stop()


if __name__ == "__main__":
    main()
