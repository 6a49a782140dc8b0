"""Shape check for Fig. 6 / the abstract's headline claim: simulated
QPS-vs-recall of Faiss (1 node) against the Harmony modes (4 nodes).

Usage: spark-submit jobs/fig6_qps_recall.py [--sf 0.01] [--datasets ...]
"""
try:  # direct spark-submit (sys.path[0] = jobs/) or module run
    from _common import config_from, parse_args
except ImportError:
    from jobs._common import config_from, parse_args
from repro.experiments.report import write_table
from repro.experiments.runner import DatasetBundle
from repro.experiments.tables import fig6_rows
from repro.sparkutil import get_session


def main() -> None:
    args = parse_args(__doc__)
    spark = get_session("fig6")
    cfg = config_from(args)
    rows = []
    for name in args.datasets or ("sift1m", "star", "glove1.2m"):
        bundle = DatasetBundle(spark, name, cfg)
        rows.extend(fig6_rows(bundle, nprobes=(2, 4, 8, 16)))
        bundle.close()
    print(write_table(
        "fig6", rows,
        "Fig. 6 shape check — simulated QPS vs recall "
        "(Faiss single-node vs Harmony modes on 4 nodes)",
    ))
    spark.stop()


if __name__ == "__main__":
    main()
