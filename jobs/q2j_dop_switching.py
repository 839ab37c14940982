"""Job E3 — §6.4.1 partitioned hash join DOP switching (Q2J)."""
from repro.experiments import q2j_switching
from repro.experiments.report import format_table


def main() -> None:
    r = q2j_switching.run()
    p = r["paper"]
    print("Q2J partitioned-join DOP switching (§6.4.1)")
    print(f"  baseline (stage DOP 2): {r['baseline_s']:.2f} s  (paper {p['baseline_s']})")
    print(f"  tuned: {r['tuned_s']:.2f} s  ({r['reduction_pct']:.2f} % reduction; "
          f"paper {p['tuned_s']} s, {p['reduction_pct']} %)")
    print(f"  query init: {r['init_time_s'] * 1e3:.0f} ms (paper 284 ms); "
          f"tuning latency avg: {r['tuning_latency_avg_s'] * 1e3:.0f} ms (paper 23 ms)")
    print(format_table(r["table2"], title="  state transfer (Table 2):"))
    print(f"  rejected: {r['rejected']}")
    print("  probe bytes consumed during each rebuild (never pauses):")
    for c in r["probe_continuity"]:
        print(f"    {c['switch']}: {c['bytes_during_rebuild'] / 1e9:.2f} GB")


if __name__ == "__main__":
    main()
