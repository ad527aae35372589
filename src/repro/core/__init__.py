"""core subpackage of the GRASP reproduction."""
