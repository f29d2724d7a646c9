"""Materialize the synthetic corpus and flavor profiles to parquet.

Usage: spark-submit jobs/build_corpus.py --out /tmp/culinarydb [--scale 1.0]
Other jobs rebuild the corpus on the fly (it is deterministic); this
entrypoint exists for inspection and for reuse outside this repo.
"""
from __future__ import annotations

from repro.culinarydb.corpus import build_corpus, write_corpus
from repro.flavordb.profiles import profiles_df


def main() -> None:
    from common import base_parser, get_spark

    p = base_parser(__doc__)
    p.add_argument("--out", required=True, help="output directory")
    args = p.parse_args()
    spark = get_spark("build_corpus")
    write_corpus(build_corpus(spark, scale=args.scale, seed=args.seed),
                 f"{args.out}/recipes")
    profiles_df(spark).write.mode("overwrite").parquet(f"{args.out}/profiles")
    print(f"corpus and profiles written under {args.out}")
    spark.stop()


if __name__ == "__main__":
    main()
