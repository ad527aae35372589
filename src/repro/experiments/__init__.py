"""experiments subpackage of the GRASP reproduction."""
