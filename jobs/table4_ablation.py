"""Regenerate Table IV (TRMMA ablation, accuracy %): 8 variants x 4 cities.

Usage: python jobs/table4_ablation.py [--n-traj 700]
"""
from _common import finish, job_args, make_spark


def main() -> None:
    args = job_args("Table IV: TRMMA ablation")
    spark = make_spark("table4")
    from repro.evalx.tables import table4, table_markdown

    data = table4(spark, n_traj=args.n_traj, cities=tuple(args.cities.split(",")),
                  seed=args.seed, verbose=args.verbose)
    finish("table4", data, args.out, table_markdown(data, ["accuracy"]))
    spark.stop()


if __name__ == "__main__":
    main()
