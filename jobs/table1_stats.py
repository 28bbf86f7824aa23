"""Reproduce Table I (OpenBG statistics): paper vs measured."""
from _session import get_spark


def main() -> None:
    from repro.tables import table1
    from repro.tables.context import ExperimentContext, df_to_markdown

    spark = get_spark("table1")
    ctx = ExperimentContext(spark)
    res = table1.run(ctx)
    print("## Table I — Overall\n" + df_to_markdown(table1.overall_rows(res)))
    print("\n## Table I — Taxonomies\n" + df_to_markdown(table1.taxonomy_rows(res)))
    print("\n## Table I — Relations\n" + df_to_markdown(table1.relation_rows(res)))
    spark.stop()


if __name__ == "__main__":
    main()
