"""The paper's contribution: Trigger Graphs (structures, construction,
minimization, and TG-guided materialization over Spark)."""
