"""Regenerate paper Table 4 (index memory comparison).

Usage: spark-submit jobs/table4_index_memory.py [--sf 0.01]
"""
try:  # direct spark-submit (sys.path[0] = jobs/) or module run
    from _common import config_from, parse_args
except ImportError:
    from jobs._common import config_from, parse_args
from repro.experiments.report import write_table
from repro.experiments.runner import DatasetBundle
from repro.experiments.tables import small_dataset_names, table4_row
from repro.sparkutil import get_session


def main() -> None:
    args = parse_args(__doc__)
    spark = get_session("table4")
    cfg = config_from(args)
    rows = []
    for name in args.datasets or small_dataset_names():
        bundle = DatasetBundle(spark, name, cfg)
        rows.append(table4_row(bundle))
        bundle.close()
    print(write_table(
        "table4", rows,
        "Table 4 — index memory (MB): single-node Faiss vs per-node mean",
    ))
    spark.stop()


if __name__ == "__main__":
    main()
