"""Reproduce Table IV (link prediction on OpenBG500 / OpenBG500-L)."""
from _session import get_spark


def main() -> None:
    from repro.tables import table4
    from repro.tables.context import ExperimentContext, df_to_markdown

    spark = get_spark("table4")
    ctx = ExperimentContext(spark)
    print("## Table IV\n" + df_to_markdown(table4.run(ctx)))
    spark.stop()


if __name__ == "__main__":
    main()
