"""Job E2 — §6.3 stage DOP runtime tuning (Q3, Q1, Q5, Q7)."""
from repro.experiments import q3_intrastage


def main() -> None:
    r = q3_intrastage.run()
    q3, p = r["q3"], r["paper"]
    print("Q3 intra-stage DOP tuning (§6.3)")
    print(f"  baseline: {q3['baseline_s']:.2f} s  tuned: {q3['tuned_s']:.2f} s "
          f"({q3['reduction_pct']:.2f} % reduction; paper {p['tuned_s']} s, {p['reduction_pct']} %)")
    print(f"  T_build averages: {q3['t_build_avg_s']}  "
          f"(paper S3 {p['t_build_s3_s']} s, S1 {p['t_build_s1_s']} s)")
    print(f"  rejected requests: {q3['rejected']}")
    print(f"  IntraStage-Inc sweep: {r['intra_stage_inc_sweep_s']}")
    for name, o in r["other_queries"].items():
        print(f"  {name}: {o['baseline_s']:.1f} -> {o['tuned_s']:.1f} s "
              f"({o['reduction_pct']:.1f} % reduction)")


if __name__ == "__main__":
    main()
