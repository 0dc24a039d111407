"""T5 (Figs. 17–19): model-type usage per data set, variant and ε.

Paper: all model types are used on every data set, and grouping shifts
usage toward Gorilla (a whole group must be constant/linear for
PMC-Mean/Swing to fit).
"""
from common import ef_job, ep_job, hd_job, show


def main() -> None:
    from repro.experiments import compression_table

    for name, maker in (("EP", ep_job), ("EF", ef_job), ("HD", hd_job)):
        _, usage, _ = compression_table(maker(),
                                        include_value_baseline=False)
        show(f"T5 — model-type usage on {name}-like", usage)


if __name__ == "__main__":
    main()
