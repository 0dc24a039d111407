"""T10 (Figs. 25–28): multi-dimensional aggregates (M-AGG).

Paper: MDB+GB is 1.52–45.14× (M-AGG-1) and 1.97–49.52× (M-AGG-2)
faster on EP; up to 630× on EF; MDB (no dimensions) and InfluxDB (no
dynamic intervals) cannot run M-AGG at all.
"""
from common import ef_job, ep_job, get_spark, show, workdir


def main() -> None:
    from repro.experiments import QueryContext, m_agg_table

    spark = get_spark("t10_magg")
    ep = ep_job()
    show("T10 — M-AGG on EP-like (GROUP BY month × measure_category)",
         m_agg_table(QueryContext(spark, ep, workdir("t10_ep")),
                     "measure_category"))
    ef = ef_job()
    show("T10 — M-AGG on EF-like (GROUP BY month × park)",
         m_agg_table(QueryContext(spark, ef, workdir("t10_ef")), "park"))
    spark.stop()


if __name__ == "__main__":
    main()
