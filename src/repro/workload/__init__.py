"""Workload generation: random DT defining queries (the paper's §6.1
property-based randomized testing) and the fleet population used for the
§6.3 usage-statistics experiments."""
