"""Reproduce paper Table 2: dataset statistics (|V|, |E|, |Psi3|, |Psi5|).

Usage: spark-submit jobs/table2_stats.py [--tiny] [--datasets HA-lite ...]
"""
import sys

from _util import dataset_args, get_session


def main(argv=None) -> None:
    args = dataset_args(argv, __doc__)
    spark, owns = get_session("table2")
    from repro.experiments import format_table, table2_rows

    print(format_table(table2_rows(spark, args.datasets), "Table 2: dataset statistics"))
    if owns:
        spark.stop()


if __name__ == "__main__":
    sys.path.insert(0, "jobs")
    main()
