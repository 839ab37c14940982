"""Job T2 — reproduce Table 2 (state-transfer details of Q2J DOP switching).

Usage: spark-submit jobs/table2_state_transfer.py (pure simulator job).
"""
from repro.experiments import q2j_switching
from repro.experiments.report import format_table


def main() -> None:
    res = q2j_switching.run()
    print(format_table(res["table2"], title="Table 2 — measured (simulator, SF100 volumes)"))
    print()
    print(format_table(res["paper"]["table2"], title="Table 2 — paper"))


if __name__ == "__main__":
    main()
