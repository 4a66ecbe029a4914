"""Table IV — effect of 4C distillation on #views per (query, noise
level): Original / C1 / C2 / C3-worst / C3-best, plus the Fig 2
contradiction-pruning series.

    spark-submit jobs/table4_distillation.py [--bench] [--json]
"""
from _common import emit, parser, session

from repro.experiments import table4_distillation


def main() -> None:
    args = parser(__doc__).parse_args()
    spark = session("table4")
    emit(table4_distillation(spark, bench=args.bench), args.json)


if __name__ == "__main__":
    main()
