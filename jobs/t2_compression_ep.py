"""T2 (Fig. 14): compression and error-bound sweep on EP-like data.

Paper: MDB+ uses up to 16.2× less storage than the industry formats on
EP; +GB 1.44–1.56× and +GA 1.18–1.37× less than -G; max avg error
0.34 % at ε = 10 %; value-baseline slightly better on EP.
"""
from common import ep_job, get_spark, show, workdir


def main() -> None:
    from repro.experiments import compression_table, industry_storage_table

    spark = get_spark("t2_compression_ep")
    ds = ep_job()
    storage, usage, groups = compression_table(ds)
    show("T2 — EP storage & avg error", storage)
    show("T2 — EP industry formats (lossless)",
         industry_storage_table(spark, ds, workdir("t2")))
    show("T5(EP) — model-type usage", usage)
    show("T2 — grouping stats / split-merge overhead", groups)
    spark.stop()


if __name__ == "__main__":
    main()
