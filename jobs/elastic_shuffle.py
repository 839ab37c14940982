"""Job E4 — §6.4.2 elastic shuffle stage (QSHUF)."""
from repro.experiments import elastic_shuffle


def main() -> None:
    r = elastic_shuffle.run()
    p = r["paper"]
    print("Elastic shuffle stage (§6.4.2)")
    print(f"  baseline (no shuffle stage): {r['baseline_s']:.2f} s  (paper {p['baseline_s']})")
    print(f"  network-bound stages at baseline: {r['baseline_network_bottlenecks']}")
    print(f"  with shuffle stage, DOP 1->5: {r['tuned_s']:.2f} s "
          f"({r['reduction_pct']:.2f} % reduction; paper {p['tuned_s']} s, {p['reduction_pct']} %)")
    print(f"  S1 throughput by shuffle-stage DOP (MB/s): "
          f"{ {k: round(v) for k, v in r['s1_throughput_by_shuffle_dop_mb_s'].items()} }")
    print(f"  bottleneck shift: {r['bottleneck_shift']}")
    print(f"  init {r['init_time_s'] * 1e3:.0f} ms (paper 232 ms); "
          f"switch latency {r['switch_latency_avg_s'] * 1e3:.0f} ms (paper 12 ms)")


if __name__ == "__main__":
    main()
