"""Query scheduling: cost prediction, policies, makespan simulation."""
