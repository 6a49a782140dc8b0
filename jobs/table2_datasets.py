"""Regenerate paper Table 2 (dataset statistics) at our lite scale.

Usage: spark-submit jobs/table2_datasets.py [--sf 0.01]
(No Spark work needed — sizes are spec-derived — but the session is
created so the job doubles as an environment check.)
"""
try:  # direct spark-submit (sys.path[0] = jobs/) or module run
    from _common import config_from, parse_args
except ImportError:
    from jobs._common import config_from, parse_args
from repro.experiments.report import write_table
from repro.experiments.tables import table2_rows
from repro.sparkutil import get_session


def main() -> None:
    args = parse_args(__doc__)
    spark = get_session("table2")
    rows = table2_rows(config_from(args))
    print(write_table("table2", rows,
                      "Table 2 — dataset statistics (lite analogs)"))
    spark.stop()


if __name__ == "__main__":
    main()
