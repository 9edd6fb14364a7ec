"""Regenerate Table V (map matching effectiveness): 7 methods x 4 cities x
{precision, recall, F1, Jaccard}.

Usage: python jobs/table5_map_matching.py [--n-traj 700]
"""
from _common import finish, job_args, make_spark


def main() -> None:
    args = job_args("Table V: map matching")
    spark = make_spark("table5")
    from repro.evalx.tables import ROUTE_METRIC_COLS, table5, table_markdown

    data = table5(spark, n_traj=args.n_traj, cities=tuple(args.cities.split(",")),
                  seed=args.seed, verbose=args.verbose)
    finish("table5", data, args.out, table_markdown(data, ROUTE_METRIC_COLS))
    spark.stop()


if __name__ == "__main__":
    main()
