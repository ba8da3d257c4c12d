"""Substrate: a Datalog/existential-rule engine over Spark DataFrames —
fact storage, join-based rule execution, chase baselines, ρDF runners."""
