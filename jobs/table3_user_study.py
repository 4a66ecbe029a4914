"""Table III — simulated user study: 18 users × (Ver presentation vs
FASTTOPK ranking). Q1 counts are directly comparable to the paper; Q2/Q3
are mechanical proxies for the survey answers (see DESIGN.md §2).

    spark-submit jobs/table3_user_study.py [--bench] [--json]
"""
from _common import emit, parser, session

from repro.experiments import table3_user_study


def main() -> None:
    args = parser(__doc__).parse_args()
    spark = session("table3")
    emit(table3_user_study(spark, bench=args.bench), args.json)


if __name__ == "__main__":
    main()
