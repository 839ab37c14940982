"""Job E1 — §6.2 task DOP runtime tuning (Q3)."""
from repro.experiments import q3_intratask


def main() -> None:
    r = q3_intratask.run()
    p = r["paper"]
    print("Q3 intra-task DOP tuning (§6.2)")
    print(f"  baseline (DOP 1,1): {r['baseline_s']:.2f} s   (paper {p['baseline_s']})")
    print(f"  tuned:              {r['tuned_s']:.2f} s   (paper {p['tuned_s']})")
    print(f"  reduction:          {r['reduction_pct']:.2f} %  (paper {p['reduction_pct']})")
    print(f"  script: {r['script']}")
    print(
        "  3rd S1 adjustment throughput before/after: "
        f"{r['saturation_thr_before_mb_s']:.1f} / {r['saturation_thr_after_mb_s']:.1f} MB/s"
        " (no gain — CPU already saturated)"
    )
    print(
        f"  plan construction: {r['plan_rpc_requests']} RESTful requests, "
        f"{r['plan_rpc_cost_s'] * 1e3:.0f} ms  (paper {p['plan_rpc_requests']} req, 313 ms)"
    )
    print(f"  driver generation: {r['driver_gen_ms']:.3f} ms  (paper < 1 ms)")
    print(f"  Intra-Task sweep (fixed n): {r['intra_task_sweep_s']}")
    print(f"  IntraTask-Inc sweep:        {r['intra_task_inc_sweep_s']}")


if __name__ == "__main__":
    main()
