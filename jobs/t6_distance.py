"""T6 (Fig. 20): storage vs grouping distance for EP/EF/HD-like data.

Paper: only the lowest non-zero distance decreases storage for all data
sets vs -G; for EF, 0.4166667 beats auto (1/6); HD's only usable
distance is 1/3 and larger distances cost 1.39–6.33× more than -G.
"""
from common import ef_job, ep_job, hd_job, show


def main() -> None:
    from repro.experiments import distance_table

    ep, ef, hd = ep_job(), ef_job(), hd_job()
    show("T6 — EP storage vs distance (Production down-weighted)",
         distance_table(ep, (0.0, 0.25, 0.5), weights={"Production": 0.5}))
    show("T6 — EF storage vs distance",
         distance_table(ef, (0.0, 1 / 6, 0.4166667, 0.5)))
    show("T6 — HD storage vs distance",
         distance_table(hd, (0.0, 1 / 3, 2 / 3)))


if __name__ == "__main__":
    main()
