"""Job E5 — §6.5.1 stage remaining execution time prediction (Q3)."""
from repro.experiments import prediction


def main() -> None:
    r = prediction.run()
    print("Stage remaining-time prediction (§6.5.1); paper:", r["paper"])
    for p in r["predictions"]:
        print(
            f"  S{p['stage']} adjusted @ {p['adjust_at_s']:.0f} s: "
            f"T_remain {p['t_remain_s']:.2f} s, T_tuning {p['t_tuning_s']:.2f} s, "
            f"n_f {p['n_f']:.2f} -> predicted end {p['predicted_end_s']:.2f} s, "
            f"actual end {p['actual_end_s']:.2f} s (error {p['abs_error_s']:.2f} s)"
        )


if __name__ == "__main__":
    main()
