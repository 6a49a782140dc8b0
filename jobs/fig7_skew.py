"""Shape check for Fig. 7: QPS under increasing load imbalance.

Usage: spark-submit jobs/fig7_skew.py [--sf 0.01] [--datasets ...]
"""
try:  # direct spark-submit (sys.path[0] = jobs/) or module run
    from _common import config_from, parse_args
except ImportError:
    from jobs._common import config_from, parse_args
from repro.experiments.report import write_table
from repro.experiments.runner import DatasetBundle
from repro.experiments.tables import fig7_rows, fig9_rows
from repro.sparkutil import get_session


def main() -> None:
    args = parse_args(__doc__)
    spark = get_session("fig7")
    cfg = config_from(args)
    rows, ab_rows = [], []
    for name in args.datasets or ("sift1m", "star", "glove1.2m"):
        bundle = DatasetBundle(spark, name, cfg)
        rows.extend(fig7_rows(bundle))
        ab_rows.extend(fig9_rows(bundle))
        bundle.close()
    print(write_table(
        "fig7", rows,
        "Fig. 7 shape check — simulated QPS under load imbalance",
    ))
    print(write_table(
        "fig9", ab_rows,
        "Fig. 9 shape check — per-technique speedup ablation",
    ))
    spark.stop()


if __name__ == "__main__":
    main()
