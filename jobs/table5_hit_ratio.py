"""Table V — ground-truth hit ratio per (strategy, noise level) over the
noisy workload (SELECT-ALL / SELECT-BEST / COLUMN-SELECTION).

    spark-submit jobs/table5_hit_ratio.py [--bench] [--json]
"""
from _common import emit, parser, session

from repro.experiments import table5_hit_ratio


def main() -> None:
    args = parser(__doc__).parse_args()
    spark = session("table5")
    rows, n_queries = table5_hit_ratio(spark, bench=args.bench)
    emit(rows, args.json)
    if not args.json:
        print(f"\nworkload: {n_queries} noisy queries")


if __name__ == "__main__":
    main()
