"""T9: point/range queries (not MDB+'s use case, for completeness).

Paper: InfluxDB wins P/R by far (20–766×); MDB+ remains competitive
with Parquet/Cassandra/ORC; grouping trades P/R speed for storage.
"""
from common import ef_job, ep_job, get_spark, show, workdir


def main() -> None:
    from repro.experiments import QueryContext, pr_table

    spark = get_spark("t9_pr")
    ep = ep_job()
    show("T9 — P/R on EP-like",
         pr_table(QueryContext(spark, ep, workdir("t9_ep"))))
    ef = ef_job()
    show("T9 — P/R on EF-like",
         pr_table(QueryContext(spark, ef, workdir("t9_ef"))))
    spark.stop()


if __name__ == "__main__":
    main()
