"""T4 (Fig. 16): compression and error-bound sweep on HD-like data.

Paper: MDB+ uses up to 48.08× less storage than the other formats on
HD; -G uses 1.36–2.54× *less* than +GA (grouping hurts on HD); max avg
error 0.15 %.
"""
from common import get_spark, hd_job, show, workdir


def main() -> None:
    from repro.experiments import compression_table, industry_storage_table

    spark = get_spark("t4_compression_hd")
    ds = hd_job()
    storage, usage, groups = compression_table(ds)
    show("T4 — HD storage & avg error", storage)
    show("T4 — HD industry formats (lossless)",
         industry_storage_table(spark, ds, workdir("t4")))
    show("T5(HD) — model-type usage", usage)
    show("T4 — grouping stats / split-merge overhead", groups)
    spark.stop()


if __name__ == "__main__":
    main()
