"""Reproduce Table II (benchmark statistics): paper vs measured."""
from _session import get_spark


def main() -> None:
    from repro.tables import table2
    from repro.tables.context import ExperimentContext, df_to_markdown

    spark = get_spark("table2")
    ctx = ExperimentContext(spark)
    print("## Table II\n" + df_to_markdown(table2.run(ctx)))
    spark.stop()


if __name__ == "__main__":
    main()
