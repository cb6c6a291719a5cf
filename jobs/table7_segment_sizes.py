"""Table VII — hyper-parameter sweep: prec@k over P1 x P2.

25 (P1, P2) combinations, each requiring a full repository re-encoding,
so the sweep runs on a reduced slice of the benchmark (first half of the
queries, untrained default head — the sweep compares configurations, not
absolute quality).
"""
from __future__ import annotations

import dataclasses

from _common import setup

from repro.bench.harness import FCMMethod, overall_metrics, run_method, sub_benchmark
from repro.bench.tables import PAPER_TABLE7
from repro.core.fcm import make_model

P1_VALUES = (15, 30, 60, 120, 240)
P2_VALUES = (16, 32, 64, 128, 256)


def run(spark, bench, *, p1s=P1_VALUES, p2s=P2_VALUES) -> dict:
    sub = sub_benchmark(
        bench, n_queries=max(2, len(bench.queries) // 2), n_distractors=80
    )
    out = {}
    for p1 in p1s:
        for p2 in p2s:
            cfg = dataclasses.replace(bench.cfg.fcm, p1=p1, p2=p2)
            mr = run_method(spark, sub, FCMMethod(make_model(cfg), name=f"FCM[{p1},{p2}]"))
            out[(p1, p2)] = overall_metrics(mr, sub)["prec"]
            print(f"[table7] P1={p1} P2={p2} prec={out[(p1, p2)]:.3f}", flush=True)
    return out


def main(argv=None):
    spark, bench, args = setup(argv)
    if args.tiny:
        got = run(spark, bench, p1s=(30, 60), p2s=(32, 64))
    else:
        got = run(spark, bench)
    print(f"\nTable VII — prec@{bench.cfg.k} over P1 x P2 (ours | paper)")
    p2s = sorted({p2 for _, p2 in got})
    header = "P1/P2"
    print(f"{header:>6s}" + "".join(f"{p2:>16d}" for p2 in p2s))
    for p1 in sorted({p1 for p1, _ in got}):
        row = ""
        for p2 in p2s:
            row += f"  {got[(p1, p2)]:5.3f} |{PAPER_TABLE7[(p1, p2)]:5.3f} "
        print(f"{p1:>6d}{row}")
    return got


if __name__ == "__main__":
    main()
