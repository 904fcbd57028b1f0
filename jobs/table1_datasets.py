"""Table 1 — graph datasets, size & heterogeneity.

Prints |V|, |E| and |L_V| of each synthetic dataset substitute next to the
paper's numbers for the original datasets. Stats are computed with Spark
DataFrame aggregations over the materialised vertex/edge tables.

    spark-submit jobs/table1_datasets.py [--scale N]
"""
from __future__ import annotations

from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.graphs.generators import PAPER_TABLE1, generate
from repro.graphs.model import edges_df, vertices_df

DATASET_ORDER = ["dblp", "provgen", "musicbrainz", "lubm", "lubm4000"]


def run(spark: SparkSession, *, scale: int = 20_000) -> str:
    hdr = (
        f"{'Dataset':<12} {'~|V|':>8} {'~|E|':>8} {'|L_V|':>5} "
        f"| {'paper |V|':>9} {'paper |E|':>9} {'paper |L_V|':>11}"
    )
    lines = [hdr, "-" * len(hdr)]
    for name in DATASET_ORDER:
        g = generate(name, scale=scale)
        v = vertices_df(spark, g)
        e = edges_df(spark, g)
        n_v = v.count()
        n_e = e.count()
        n_l = v.agg(F.countDistinct("label").alias("n")).collect()[0]["n"]
        pv, pe, pl, _real = PAPER_TABLE1[name]
        lines.append(
            f"{name:<12} {n_v:>8} {n_e:>8} {n_l:>5} | {pv:>9} {pe:>9} {pl:>11}"
        )
    return "\n".join(lines)


def main() -> None:
    try:
        from jobs.common import job_parser, job_session
    except ImportError:  # invoked as `spark-submit jobs/<name>.py`
        from common import job_parser, job_session

    args = job_parser(__doc__).parse_args()
    print(run(job_session("table1"), scale=args.scale))


if __name__ == "__main__":
    main()
