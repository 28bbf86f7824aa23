"""Reproduce Table V (five downstream tasks, full resource)."""
from _session import get_spark


def main() -> None:
    from repro.tables import table5
    from repro.tables.context import ExperimentContext, df_to_markdown

    spark = get_spark("table5")
    ctx = ExperimentContext(spark)
    print("## Table V\n" + df_to_markdown(table5.run(ctx)))
    spark.stop()


if __name__ == "__main__":
    main()
