"""Reproduce Table VI (low-resource category prediction)."""
from _session import get_spark


def main() -> None:
    from repro.tables import table6
    from repro.tables.context import ExperimentContext, df_to_markdown

    spark = get_spark("table6")
    ctx = ExperimentContext(spark)
    print("## Table VI\n" + df_to_markdown(table6.run(ctx)))
    spark.stop()


if __name__ == "__main__":
    main()
