"""T1 (Fig. 13): ingestion rate per system + stability over rounds.

Paper: MDB+GA ingests 2.16–13.7× faster than the other formats due to
compression; MDB+-G is 1.89× faster than MDB; the rate is stable over
1.5 days (±3 %).
"""
from common import ep_job, get_spark, show, workdir


def main() -> None:
    from repro.experiments import ingestion_stability, ingestion_table

    spark = get_spark("t1_ingestion")
    ds = ep_job()
    show("T1 — ingestion rate, single-threaded harness",
         ingestion_table(spark, ds, workdir("t1"), parallel=False))
    show("T1 — ingestion rate, Spark-parallel GOLEMM",
         ingestion_table(spark, ds, workdir("t1p"), parallel=True))
    show("T1b — ingestion stability (repeated rounds)",
         ingestion_stability(ds, rounds=5))
    spark.stop()


if __name__ == "__main__":
    main()
