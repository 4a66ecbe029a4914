"""Run Ver end-to-end for an ad-hoc QBE query against a synthetic corpus.

Example:
    spark-submit jobs/run_query.py --corpus wdc \
        --column Georgia Indiana Virginia --column "Georgia Daily Times"
"""
from _common import emit, parser, session

from repro import workloads
from repro.core.pipeline import run_pipeline
from repro.core.qbe import ExampleQuery


def main() -> None:
    p = parser(__doc__)
    p.add_argument("--corpus", default="wdc",
                   choices=["wdc", "chembl", "opendata"])
    p.add_argument("--column", action="append", nargs="+", required=True,
                   metavar="EXAMPLE", help="example values for one query "
                   "column (repeat per column)")
    p.add_argument("--strategy", default="column_selection",
                   choices=["column_selection", "select_all", "select_best"])
    p.add_argument("--top", type=int, default=10)
    args = p.parse_args()

    spark = session("run_query")
    col, _ = workloads.corpus(args.corpus, args.bench)
    idx = workloads.index(spark, args.corpus, args.bench)
    q = ExampleQuery.of(*args.column)
    r = run_pipeline(col, idx, q, spark=spark, strategy=args.strategy,
                     run_distillation=True)
    d = r.distillation
    emit({
        "candidate views": r.n_views,
        "after compatible dedup (C1)": d.after_c1,
        "after containment prune (C2)": d.after_c2,
        "after complementary union (C3 best)": d.c3_best,
        "contradiction signals": len(d.contradictions),
        "timings": {k: round(v, 3) for k, v in r.timings.items()},
    }, args.json)
    print("\ntop views:")
    for v in r.views[:args.top]:
        tables = ",".join(sorted(v.spec.graph.tables))
        print(f"  #{v.view_id:<4d} rows={v.n_rows:<6d} "
              f"schema={v.schema_key} tables=[{tables}]")


if __name__ == "__main__":
    main()
