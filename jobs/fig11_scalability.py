"""Shape check for §6.5.2 (Fig. 11b): Harmony speedup vs node count.

Usage: spark-submit jobs/fig11_scalability.py [--sf 0.01]
"""
try:  # direct spark-submit (sys.path[0] = jobs/) or module run
    from _common import config_from, parse_args
except ImportError:
    from jobs._common import config_from, parse_args

from dataclasses import replace

from repro.experiments.report import write_table
from repro.experiments.runner import DatasetBundle, qps
from repro.sparkutil import get_session


def main() -> None:
    args = parse_args(__doc__)
    spark = get_session("fig11")
    base_cfg = config_from(args)
    rows = []
    for name in args.datasets or ("sift1m",):
        for n in (2, 4, 8):
            cfg = replace(base_cfg, n_nodes=n)
            bundle = DatasetBundle(spark, name, cfg)
            b = bundle.faiss()
            t1 = b.simulated_seconds(cfg.machine)
            row = {"dataset": name, "nodes": n,
                   "faiss_qps": qps(len(bundle.queries), t1)}
            for mode in ("vector", "dimension", "harmony"):
                s = bundle.searcher(mode)
                res = s.search(bundle.queries, k=cfg.k, nprobe=cfg.nprobe)
                t = res.report.simulated_seconds(cfg.machine)
                row[f"{mode}_speedup"] = t1 / t
            rows.append(row)
            bundle.close()
    print(write_table(
        "fig11", rows,
        "Fig. 11b shape check — speedup over 1-node faiss_lite "
        "by node count",
    ))
    spark.stop()


if __name__ == "__main__":
    main()
