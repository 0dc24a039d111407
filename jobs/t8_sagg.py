"""T8 (Figs. 23–24): small simple aggregates (S-AGG) on EP- and EF-like.

Paper: on EP MDB+ is much faster than Cassandra and slightly slower
than the columnar formats; on EF only Parquet is significantly faster
(4.38×) while using 41–44× more storage; larger groups slow single-
series queries (storage/performance trade-off).
"""
from common import ef_job, ep_job, get_spark, show, workdir


def main() -> None:
    from repro.experiments import QueryContext, s_agg_table

    spark = get_spark("t8_sagg")
    ep = ep_job()
    show("T8 — S-AGG on EP-like",
         s_agg_table(QueryContext(spark, ep, workdir("t8_ep"))))
    ef = ef_job()
    show("T8 — S-AGG on EF-like",
         s_agg_table(QueryContext(spark, ef, workdir("t8_ef"))))
    spark.stop()


if __name__ == "__main__":
    main()
