"""Figure 7 — which expectation model predicts (simulated) user
processing of conflicting facts best; run for both study scenarios.

Usage: spark-submit jobs/fig7_models.py
"""
from repro.studies.simulate import conflicting_facts_study


def main() -> None:
    print("Paper Fig. 7: 'closest relevant value' has the lowest median error.")
    acs = conflicting_facts_study(
        dim_a="borough",
        values_a=("Staten Island", "Bronx"),
        facts_a=(20.0, 40.0),
        dim_b="age_group",
        values_b=("children", "elder"),
        facts_b=(5.0, 80.0),
        truths={
            ("Staten Island", "children"): 6.0,
            ("Staten Island", "elder"): 70.0,
            ("Bronx", "children"): 8.0,
            ("Bronx", "elder"): 90.0,
        },
        prior=30.0,
        seed=0,
    )
    flights = conflicting_facts_study(
        dim_a="season",
        values_a=("Winter", "Summer"),
        facts_a=(25.0, 12.0),
        dim_b="daytime",
        values_b=("morning", "evening"),
        facts_b=(8.0, 30.0),
        truths={
            ("Winter", "morning"): 15.0,
            ("Winter", "evening"): 33.0,
            ("Summer", "morning"): 6.0,
            ("Summer", "evening"): 22.0,
        },
        prior=18.0,
        seed=1,
    )
    for name, errs in (("ACS", acs), ("Flights", flights)):
        print(f"\n{name} — median |worker - model| error:")
        for model, err in sorted(errs.items(), key=lambda kv: kv[1]):
            print(f"  {model:>14}: {err:.2f}")


if __name__ == "__main__":
    main()
