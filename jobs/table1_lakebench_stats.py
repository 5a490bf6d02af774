"""Reproduce Table 1: LakeBench benchmark statistics.

Builds all 8 benchmarks and computes, via Spark aggregations over the
cell-long lake, the table counts, average rows/columns, pair-split
sizes and column data-type distribution.
"""
from _common import arg_parser, emit, session


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = session("table1")
    from repro.lakebench import registry

    df = registry.table1(spark, scale=args.scale, seed=args.seed)
    emit(df, args.out, "Table 1 — LakeBench statistics")
    spark.stop()


if __name__ == "__main__":
    main()
