"""T3 (Fig. 15): compression and error-bound sweep on EF-like data.

Paper: MDB+ uses up to 113× less storage than the other formats on EF;
+GB 1.60–1.96× and +GA 1.37–1.75× less than -G; max avg error 1.72 %.
"""
from common import ef_job, get_spark, show, workdir


def main() -> None:
    from repro.experiments import compression_table, industry_storage_table

    spark = get_spark("t3_compression_ef")
    ds = ef_job()
    storage, usage, groups = compression_table(ds)
    show("T3 — EF storage & avg error", storage)
    show("T3 — EF industry formats (lossless)",
         industry_storage_table(spark, ds, workdir("t3")))
    show("T5(EF) — model-type usage", usage)
    show("T3 — grouping stats / split-merge overhead", groups)
    spark.stop()


if __name__ == "__main__":
    main()
