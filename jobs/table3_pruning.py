"""Regenerate paper Table 3 (per-slice pruning ratios, 4 nodes).

Usage: spark-submit jobs/table3_pruning.py [--sf 0.01] [--datasets ...]
"""
try:  # direct spark-submit (sys.path[0] = jobs/) or module run
    from _common import config_from, parse_args
except ImportError:
    from jobs._common import config_from, parse_args
from repro.experiments.report import write_table
from repro.experiments.runner import DatasetBundle
from repro.experiments.tables import small_dataset_names, table3_row
from repro.sparkutil import get_session


def main() -> None:
    args = parse_args(__doc__)
    spark = get_session("table3")
    cfg = config_from(args)
    rows = []
    for name in args.datasets or small_dataset_names():
        bundle = DatasetBundle(spark, name, cfg)
        rows.append(table3_row(bundle))
        bundle.close()
    print(write_table(
        "table3", rows,
        "Table 3 — average pruning ratio across four nodes (%)",
    ))
    spark.stop()


if __name__ == "__main__":
    main()
