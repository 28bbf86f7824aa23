"""Reproduce Table VII (low-resource NER for titles)."""
from _session import get_spark


def main() -> None:
    from repro.tables import table7
    from repro.tables.context import ExperimentContext, df_to_markdown

    spark = get_spark("table7")
    ctx = ExperimentContext(spark)
    print("## Table VII\n" + df_to_markdown(table7.run(ctx)))
    spark.stop()


if __name__ == "__main__":
    main()
