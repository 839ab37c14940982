"""Job E6 — §6.5.2 automatic DOP tuning (Q2 and Q3)."""
from repro.experiments import autotune


def main() -> None:
    r = autotune.run()
    q2, q3 = r["q2"], r["q3"]
    print("Automatic DOP tuning (§6.5.2)")
    print(f"  Q2: total {q2['total_s']:.1f} s (target {q2['target_s']:.0f} s, met={q2['met']}); "
          f"S11 scan ends {q2['scan_end_s11_s']:.1f} s, S2 scan ends {q2['scan_end_s2_s']:.1f} s; "
          f"RP latency {q2['rp_latency_avg_s'] * 1e3:.0f} ms (paper 42 ms)")
    for a in q2["adjustments"]:
        print(f"    {a['t']:>6}s  {a['action']}" + ("" if a["accepted"] else f"  REJECTED: {a['reason']}"))
    print(f"  Q3: total {q3['total_s']:.1f} s (target {q3['target_s']:.0f} s, met={q3['met']}); "
          f"new 30 s constraint at 150 s -> S1 ends {q3['s1_end_s']:.1f} s "
          f"(deadline {q3['new_constraint_deadline_s']:.0f} s, met={q3['new_constraint_met']})")
    for a in q3["adjustments"]:
        print(f"    {a['t']:>6}s  {a['action']}" + ("" if a["accepted"] else f"  REJECTED: {a['reason']}"))


if __name__ == "__main__":
    main()
