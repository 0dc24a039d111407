"""T7 (Figs. 21–22): L-AGG over the full data set + weak-scaling sweep.

Paper: on the cluster Parquet is only 1.66× faster than MDB+GB for
L-AGG (while 11.6× bigger on disk); on Azure MDB+GB scales linearly
for Segment View (S) and Data Point View (DP).  Here linear scalability
appears as query time growing ∝ data copies at fixed parallelism.
"""
from common import ep_job, get_spark, show, workdir


def main() -> None:
    from repro.experiments import (QueryContext, l_agg_table,
                                   query_error_table, scale_out_table)

    spark = get_spark("t7_scaleout")
    ds = ep_job()
    ctx = QueryContext(spark, ds, workdir("t7"))
    show("T7 — L-AGG query time (full data set)", l_agg_table(ctx))
    show("T7 — average aggregate result error", query_error_table(ctx))
    show("T7b — weak scaling (copies of EP-like)",
         scale_out_table(spark, ds, workdir("t7b"), copies=(1, 2, 4)))
    spark.stop()


if __name__ == "__main__":
    main()
