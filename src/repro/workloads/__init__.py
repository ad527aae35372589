"""workloads subpackage of the GRASP reproduction."""
