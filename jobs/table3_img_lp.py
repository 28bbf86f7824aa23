"""Reproduce Table III (link prediction on OpenBG-IMG)."""
from _session import get_spark


def main() -> None:
    from repro.tables import table3
    from repro.tables.context import ExperimentContext, df_to_markdown

    spark = get_spark("table3")
    ctx = ExperimentContext(spark)
    print("## Table III\n" + df_to_markdown(table3.run(ctx)))
    spark.stop()


if __name__ == "__main__":
    main()
