"""baselines subpackage of the GRASP reproduction."""
