"""4C scalability sweep (paper Fig 3 / Section VI-B4): VIEW-DISTILLATION
runtime vs number of views over Open-Data subsamples of 25/50/75/100% of
tables. Figures are out of scope; this prints the underlying numbers
because Table IV's scalability claims rest on them.

    spark-submit jobs/fig3_scalability.py [--bench] [--json]
"""
import time

from _common import emit, parser, session

from repro import workloads
from repro.core.distillation import distill
from repro.core.pipeline import run_pipeline
from repro.corpus import NoiseLevel, noisy_query, synth_opendata
from repro.discovery import build_index


def main() -> None:
    p = parser(__doc__)
    p.add_argument("--max-views", type=int, default=2000,
                   help="cap materialized views per portion (the paper "
                   "materializes all; the cap keeps the --bench sweep "
                   "tractable and the runtime-vs-#views growth intact)")
    args = p.parse_args()
    spark = session("fig3")
    base = (workloads.BENCH_SCALE if args.bench
            else workloads.TEST_SCALE)["opendata"]
    rows = []
    for portion in (0.25, 0.5, 0.75, 1.0):
        col, queries = synth_opendata(n_tables=int(base * portion))
        idx = build_index(spark, col)
        q = noisy_query(col, queries[0], NoiseLevel.ZERO, seed=0)
        r = run_pipeline(col, idx, q, k=args.max_views)
        t0 = time.perf_counter()
        d = distill(spark, r.views)
        rows.append({
            "portion": portion,
            "n_tables": col.n_tables,
            "n_views": r.n_views,
            "get_views_s": round(r.timings["materializer"], 3),
            "four_c_s": round(time.perf_counter() - t0, 3),
            "reduction_ratio": round(d.reduction_ratio(), 3),
        })
    emit(rows, args.json)


if __name__ == "__main__":
    main()
