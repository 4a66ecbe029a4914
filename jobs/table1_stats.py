"""Table I — corpus characteristics (#tables, #columns, #joinable column
pairs, #rows, size) for the three synthetic corpora.

    spark-submit jobs/table1_stats.py [--bench] [--json]
"""
from _common import emit, parser, session

from repro.experiments import table1_corpus_stats


def main() -> None:
    args = parser(__doc__).parse_args()
    spark = session("table1")
    emit(table1_corpus_stats(spark, bench=args.bench), args.json)


if __name__ == "__main__":
    main()
